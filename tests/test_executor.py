"""Unit tests for node compilation and the join fold."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core.executor import (
    compile_node,
    compile_vp_pattern,
    join_results,
    project,
)
from repro.core.jointree import group_patterns
from repro.core.loader import ProstStore
from repro.rdf.triples import to_spark
from repro.sparql.parser import parse

TINY = pd.DataFrame(
    [
        ("u1", "wsdbm:likes", "p1"),
        ("u1", "wsdbm:likes", "p2"),
        ("u2", "wsdbm:likes", "p1"),
        ("u1", "foaf:age", "26"),
        ("u2", "foaf:age", "30"),
        ("u3", "foaf:age", "26"),
        ("p1", "og:title", "t1"),
        ("u1", "wsdbm:friendOf", "u2"),
        ("u2", "wsdbm:friendOf", "u2"),
    ],
    columns=["s", "p", "o"],
)


@pytest.fixture(scope="module")
def tiny_store(spark):
    return ProstStore.load(spark, to_spark(spark, TINY))


def rows(df):
    return sorted(tuple(r) for r in df.toPandas().itertuples(index=False))


def pattern(text: str):
    return parse(f"SELECT * WHERE {{ {text} }}").patterns[0]


class TestCompileVpPattern:
    def test_two_variables(self, tiny_store):
        df = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("?a wsdbm:likes ?b ."))
        assert sorted(df.columns) == ["a", "b"]
        assert rows(df.select("a", "b")) == [("u1", "p1"), ("u1", "p2"), ("u2", "p1")]

    def test_constant_object(self, tiny_store):
        df = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("?a wsdbm:likes <p1> ."))
        assert rows(df) == [("u1",), ("u2",)]

    def test_constant_subject(self, tiny_store):
        df = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("<u1> wsdbm:likes ?b ."))
        assert rows(df) == [("p1",), ("p2",)]

    def test_literal_object(self, tiny_store):
        df = compile_vp_pattern(tiny_store.vp_table("foaf:age"), pattern('?a foaf:age "26" .'))
        assert rows(df) == [("u1",), ("u3",)]

    def test_repeated_variable(self, tiny_store):
        df = compile_vp_pattern(
            tiny_store.vp_table("wsdbm:friendOf"), pattern("?x wsdbm:friendOf ?x .")
        )
        assert rows(df) == [("u2",)]

    def test_fully_ground_exists(self, tiny_store):
        df = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("<u1> wsdbm:likes <p1> ."))
        assert df.count() == 1  # existence row

    def test_fully_ground_no_match(self, tiny_store):
        df = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("<u9> wsdbm:likes <p1> ."))
        assert df.count() == 0


class TestCompilePtNode:
    def node(self, text: str, mode="mixed"):
        return group_patterns(parse(f"SELECT * WHERE {{ {text} }}"), mode)[0]

    def test_star_two_single_valued(self, tiny_store):
        node = self.node("?u foaf:age ?a . ?u og:title ?t .")
        # no subject has both -> empty
        assert compile_node(tiny_store, node).count() == 0

    def test_star_single_and_multi(self, tiny_store):
        node = self.node("?u foaf:age ?a . ?u wsdbm:likes ?l .")
        df = compile_node(tiny_store, node)
        assert rows(df.select("u", "a", "l")) == [
            ("u1", "26", "p1"),
            ("u1", "26", "p2"),
            ("u2", "30", "p1"),
        ]

    def test_multi_valued_constant_object(self, tiny_store):
        node = self.node("?u wsdbm:likes <p2> . ?u foaf:age ?a .")
        df = compile_node(tiny_store, node)
        assert rows(df.select("u", "a")) == [("u1", "26")]

    def test_two_multi_valued_product(self, tiny_store):
        node = self.node("?u wsdbm:likes ?x . ?u wsdbm:likes ?y .")
        df = compile_node(tiny_store, node)
        # u1: 2x2 pairs, u2: 1 -> 5 rows (bag product semantics)
        assert df.count() == 5

    def test_constant_subject_star(self, tiny_store):
        node = self.node("<u1> foaf:age ?a . <u1> wsdbm:likes ?l .")
        df = compile_node(tiny_store, node)
        assert rows(df.select("a", "l")) == [("26", "p1"), ("26", "p2")]

    def test_missing_predicate_empty(self, tiny_store):
        node = self.node("?u foaf:age ?a . ?u wsdbm:neverUsedPred ?x .")
        df = compile_node(tiny_store, node)
        assert df.count() == 0 and set(df.columns) == {"u", "a", "x"}


class TestJoinAndProject:
    def test_natural_join_on_shared(self, tiny_store):
        likes = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("?u wsdbm:likes ?p ."))
        title = compile_vp_pattern(tiny_store.vp_table("og:title"), pattern("?p og:title ?t ."))
        out = join_results([likes, title])
        assert rows(out.select("u", "p", "t")) == [("u1", "p1", "t1"), ("u2", "p1", "t1")]

    def test_cross_join_when_disjoint(self, tiny_store):
        age = compile_vp_pattern(tiny_store.vp_table("foaf:age"), pattern("?a foaf:age ?x ."))
        title = compile_vp_pattern(tiny_store.vp_table("og:title"), pattern("?p og:title ?t ."))
        assert join_results([age, title]).count() == 3 * 1

    def test_exists_relation_filters(self, tiny_store):
        exists = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("<u9> wsdbm:likes <p1> ."))
        age = compile_vp_pattern(tiny_store.vp_table("foaf:age"), pattern("?a foaf:age ?x ."))
        out = join_results([age, exists])
        assert out.count() == 0 and "__exists__" not in out.columns

    def test_project_selects_and_orders(self, tiny_store):
        likes = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("?u wsdbm:likes ?p ."))
        q = parse("SELECT ?p ?u WHERE { ?u wsdbm:likes ?p . }")
        out = project(likes, q)
        assert out.columns == ["p", "u"]

    def test_project_distinct(self, tiny_store):
        likes = compile_vp_pattern(tiny_store.vp_table("wsdbm:likes"), pattern("?u wsdbm:likes ?p ."))
        q = parse("SELECT DISTINCT ?u WHERE { ?u wsdbm:likes ?p . }")
        assert project(likes, q).count() == 2
