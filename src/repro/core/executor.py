"""Join Tree execution with Spark SQL DataFrames (paper §3.2).

Each Join Tree node compiles to a DataFrame whose columns are the
node's variable names; the executor then folds the execution order
with inner joins on the shared variables (a natural join), letting
Catalyst produce the physical plans — exactly the division of labour
the paper describes (§3.3: "Spark intervenes in producing optimized
physical plans").

Patterns binding no variables (fully constant) compile to a 0/1-row
existence relation and enter the fold as a cross join.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.jointree import JoinTree, Node, PTNode, VPNode, build_join_tree
from repro.core.loader import ProstStore, empty_result
from repro.rdf.triples import safe_name
from repro.sparql.algebra import Query, TriplePattern, Variable, is_const, is_var

#: internal column marking a variable-free pattern's existence result
_EXISTS_COL = "__exists__"


class _Binder:
    """Tracks variable → column bindings while compiling one node."""

    def __init__(self) -> None:
        self.bound: dict[str, str] = {}  # var name -> physical column
        self.filters: list = []  # pyspark Column predicates

    def bind(self, var: Variable, column: str) -> None:
        """First occurrence names the column; repeats become equalities."""
        if var.name in self.bound:
            self.filters.append(F.col(self.bound[var.name]) == F.col(column))
        else:
            self.bound[var.name] = column


def compile_vp_pattern(df: DataFrame, tp: TriplePattern) -> DataFrame:
    """Compile one triple pattern against its ``(s, o)`` VP table.

    Shared by PRoST's VP nodes and by the S2RDF baseline (which feeds
    an ExtVP table as *df*).
    """
    b = _Binder()
    if is_const(tp.s):
        b.filters.append(F.col("s") == tp.s.value)
    else:
        b.bind(tp.s, "s")
    if is_const(tp.o):
        b.filters.append(F.col("o") == tp.o.value)
    else:
        b.bind(tp.o, "o")
    for f in b.filters:
        df = df.filter(f)
    if not b.bound:
        return df.limit(1).select(F.lit(1).alias(_EXISTS_COL))
    return df.select(*[F.col(c).alias(v) for v, c in b.bound.items()])


def compile_vp_node(store: ProstStore, node: VPNode) -> DataFrame:
    tp = node.pattern
    if not store.has_predicate(tp.predicate):
        cols = tuple(node.variables()) or (_EXISTS_COL,)
        return empty_result(store.spark, cols)
    return compile_vp_pattern(store.vp_table(tp.predicate), tp)


def compile_pt_node(store: ProstStore, node: PTNode) -> DataFrame:
    """Compile a subject-star group against the Property Table.

    Selection + (for multi-valued predicates) explodes — no joins, the
    whole point of the PT. Multi-valued columns are arrays of the
    subject's *distinct* objects (the graph is a set), so
    ``array_contains`` is an exact constant-match and nested explodes
    reproduce the bag product SPARQL semantics requires.
    """
    missing = [tp for tp in node.patterns if not store.has_predicate(tp.predicate)]
    if missing:
        cols = tuple(node.variables()) or (_EXISTS_COL,)
        return empty_result(store.spark, cols)

    df = store.property_table
    b = _Binder()

    first = node.patterns[0]
    if is_const(first.s):
        df = df.filter(F.col("s") == first.s.value)
    else:
        b.bind(first.s, "s")

    for i, tp in enumerate(node.patterns):
        col = safe_name(tp.predicate)
        if store.is_multi_valued(tp.predicate):
            if is_const(tp.o):
                df = df.filter(F.array_contains(F.col(col), tp.o.value))
            else:
                out = f"__x{i}__"
                df = df.select("*", F.explode(F.col(col)).alias(out))
                b.bind(tp.o, out)
        else:
            df = df.filter(F.col(col).isNotNull())
            if is_const(tp.o):
                df = df.filter(F.col(col) == tp.o.value)
            else:
                b.bind(tp.o, col)

    for f in b.filters:
        df = df.filter(f)
    if not b.bound:
        return df.limit(1).select(F.lit(1).alias(_EXISTS_COL))
    return df.select(*[F.col(c).alias(v) for v, c in b.bound.items()])


def compile_node(store: ProstStore, node: Node) -> DataFrame:
    if isinstance(node, VPNode):
        return compile_vp_node(store, node)
    return compile_pt_node(store, node)


def join_results(parts: list[DataFrame]) -> DataFrame:
    """Fold node results with natural inner joins (cross join when the
    next relation shares no column — disconnected sub-queries)."""
    result = parts[0]
    for nxt in parts[1:]:
        shared = [c for c in result.columns if c in nxt.columns and c != _EXISTS_COL]
        if shared:
            result = result.join(nxt, on=shared, how="inner")
        else:
            result = result.crossJoin(nxt)
    drop = [c for c in result.columns if c == _EXISTS_COL]
    return result.drop(*drop) if drop else result


def project(result: DataFrame, query: Query) -> DataFrame:
    cols = list(query.projection())
    out = result.select(*cols) if cols else result
    return out.distinct() if query.distinct else out


def execute_tree(store: ProstStore, tree: JoinTree, query: Query) -> DataFrame:
    parts = [compile_node(store, n) for n in tree.execution_order]
    return project(join_results(parts), query)


def execute(store: ProstStore, query: Query, mode: str = "mixed") -> DataFrame:
    """Plan and run *query*; returns a DataFrame with one column per
    projected variable."""
    tree = build_join_tree(query, store.stats, mode=mode)
    return execute_tree(store, tree, query)
