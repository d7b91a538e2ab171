"""Tests for the Rya baseline: sorted indexes, range scans, NLJ engine."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.baselines.rya import INDEX_ORDERS, RyaStore, choose_index
from repro.oracle import assert_equivalent_pd
from repro.sparql.parser import parse
from repro.sparql.reference import bgp_to_sql
from repro.sparql.watdiv_queries import QUERIES

TINY = pd.DataFrame(
    [
        ("u1", "likes", "p1"),
        ("u1", "likes", "p2"),
        ("u2", "likes", "p1"),
        ("u1", "age", "26"),
        ("u2", "age", "30"),
        ("p1", "title", "t1"),
    ],
    columns=["s", "p", "o"],
)


@pytest.fixture(scope="module")
def tiny():
    return RyaStore.load(TINY)


class TestIndexes:
    def test_three_indexes(self, tiny):
        assert set(tiny.indexes) == {"spo", "pos", "osp"}

    @pytest.mark.parametrize("name", sorted(INDEX_ORDERS))
    def test_keys_sorted(self, tiny, name):
        keys = tiny.indexes[name].keys
        assert (keys[:-1] <= keys[1:]).all()

    @pytest.mark.parametrize("name", sorted(INDEX_ORDERS))
    def test_indexes_hold_all_triples(self, tiny, name):
        assert len(tiny.indexes[name].keys) == len(TINY)

    def test_scan_full(self, tiny):
        assert len(tiny.indexes["spo"].scan(())) == len(TINY)

    def test_scan_prefix_one(self, tiny):
        rng = tiny.indexes["spo"].scan(("u1",))
        assert len(rng) == 3

    def test_scan_prefix_two(self, tiny):
        rng = tiny.indexes["spo"].scan(("u1", "likes"))
        assert len(rng) == 2

    def test_scan_prefix_full_triple(self, tiny):
        assert len(tiny.indexes["spo"].scan(("u1", "likes", "p2"))) == 1

    def test_scan_no_match(self, tiny):
        assert len(tiny.indexes["spo"].scan(("zz",))) == 0

    def test_scan_no_false_prefix_match(self, tiny):
        # "u" must not match "u1": composite keys use a separator
        assert len(tiny.indexes["spo"].scan(("u",))) == 0

    def test_full_triple_scan_is_exact(self):
        """Regression: a fully-bound probe must not prefix-match a
        longer value ("Topic1" vs "Topic10")."""
        df = pd.DataFrame(
            [("a", "tag", "Topic1"), ("a", "tag", "Topic10"), ("b", "tag", "Topic10")],
            columns=["s", "p", "o"],
        )
        store = RyaStore.load(df)
        assert len(store.indexes["spo"].scan(("a", "tag", "Topic1"))) == 1
        assert len(store.indexes["spo"].scan(("b", "tag", "Topic1"))) == 0
        out = store.query(
            "SELECT ?x WHERE { ?x <tag> <Topic10> . ?x <tag> <Topic1> . }"
        )
        assert sorted(out["x"]) == ["a"]

    def test_pos_scan_by_predicate(self, tiny):
        assert len(tiny.indexes["pos"].scan(("likes",))) == 3

    def test_osp_scan_by_object(self, tiny):
        assert len(tiny.indexes["osp"].scan(("p1",))) == 2

    def test_row_roundtrip(self, tiny):
        idx = tiny.indexes["pos"]
        rows = {tuple(idx.row(i).values()) for i in idx.scan(("age",))}
        assert rows == {("u1", "age", "26"), ("u2", "age", "30")}


class TestChooseIndex:
    @pytest.mark.parametrize(
        "bound,expected",
        [
            ({"s"}, "spo"),
            ({"s", "p"}, "spo"),
            ({"s", "p", "o"}, "spo"),
            ({"p"}, "pos"),
            ({"p", "o"}, "pos"),
            ({"o"}, "osp"),
            (set(), "spo"),
        ],
    )
    def test_choice(self, bound, expected):
        assert choose_index(bound) == expected


class TestTinyQueries:
    def test_star(self, tiny):
        out = tiny.query("SELECT ?u ?a ?l WHERE { ?u <age> ?a . ?u <likes> ?l . }")
        assert sorted(map(tuple, out.values)) == [
            ("u1", "26", "p1"),
            ("u1", "26", "p2"),
            ("u2", "30", "p1"),
        ]

    def test_chain(self, tiny):
        out = tiny.query("SELECT ?u ?t WHERE { ?u <likes> ?p . ?p <title> ?t . }")
        assert sorted(map(tuple, out.values)) == [("u1", "t1"), ("u2", "t1")]

    def test_constant_anchor(self, tiny):
        out = tiny.query("SELECT ?o WHERE { <u1> <likes> ?o . }")
        assert sorted(out["o"]) == ["p1", "p2"]

    def test_distinct(self, tiny):
        out = tiny.query("SELECT DISTINCT ?u WHERE { ?u <likes> ?p . }")
        assert sorted(out["u"]) == ["u1", "u2"]

    def test_empty(self, tiny):
        out = tiny.query("SELECT ?u WHERE { ?u <nope> ?p . }")
        assert len(out) == 0 and list(out.columns) == ["u"]

    def test_repeated_variable_pattern(self, tiny):
        out = tiny.query("SELECT ?x WHERE { ?x <likes> ?x . }")
        assert len(out) == 0

    def test_join_order_most_bound_first(self, tiny):
        q = parse("SELECT ?u ?t WHERE { ?u <likes> ?p . ?p <title> <t1> . }")
        ordered = tiny._order(q)
        assert ordered[0].predicate == "title"


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_queries_match_oracle(rya, triples_pd, name):
    sparql = QUERIES[name]
    assert_equivalent_pd(
        rya.query(sparql), bgp_to_sql(parse(sparql)), triples=triples_pd
    )


def test_f4_oracle_at_scale_one():
    """Regression at a scale where entity ids collide as string
    prefixes (Topic1/Topic10) — the exact-probe bug's habitat."""
    from repro.rdf.watdiv import watdiv_pandas

    graph = watdiv_pandas(scale=1.0, seed=42)
    store = RyaStore.load(graph)
    sparql = QUERIES["F4"]
    assert_equivalent_pd(
        store.query(sparql), bgp_to_sql(parse(sparql)), triples=graph
    )


class TestPersistence:
    def test_indexes_written_as_sorted_key_files(self, tmp_path):
        RyaStore.load(TINY, path=str(tmp_path))
        files = sorted(f.name for f in tmp_path.iterdir())
        assert files == ["osp.keys", "pos.keys", "spo.keys"]
        lines = (tmp_path / "spo.keys").read_text().splitlines()
        assert len(lines) == len(TINY)
        assert lines == sorted(lines)
        assert all(len(line.split("\x1f")) == 3 for line in lines)

    def test_distributed_ingest_matches_driver_load(self, spark, tmp_path):
        from repro.rdf.triples import to_spark

        store = RyaStore.load_distributed(
            spark, to_spark(spark, TINY), TINY, path=str(tmp_path)
        )
        assert store.pred_counts == {"likes": 3, "age": 2, "title": 1}
        spo_dir = tmp_path / "spo"
        lines = []
        for f in sorted(spo_dir.iterdir()):
            if not f.name.startswith(("_", ".")):
                lines += f.read_text().splitlines()
        assert sorted(lines) == sorted(store.indexes["spo"].keys)

    def test_pred_counts(self, tiny):
        assert tiny.pred_counts == {"likes": 3, "age": 2, "title": 1}


class TestNetworkModel:
    def test_probe_counter(self, tiny):
        tiny.query("SELECT ?u ?t WHERE { ?u <likes> ?p . ?p <title> ?t . }")
        # title scans first (smaller extent): 1 seed probe, then one
        # probe for its single binding against the likes pattern
        assert tiny.last_probes == 2

    def test_latency_off_by_default(self, tiny):
        assert tiny.rpc_latency_s == 0.0

    def test_latency_slows_queries(self):
        import time

        fast = RyaStore.load(TINY)
        slow = RyaStore.load(TINY)
        slow.rpc_latency_s = 0.01
        slow.ranges_per_rpc = 1
        q = "SELECT ?u ?t WHERE { ?u <likes> ?p . ?p <title> ?t . }"
        t0 = time.perf_counter()
        fast.query(q)
        t_fast = time.perf_counter() - t0
        t0 = time.perf_counter()
        slow.query(q)
        t_slow = time.perf_counter() - t0
        assert t_slow > t_fast + 0.015  # 2 probes x 10ms

    def test_results_unaffected_by_latency(self):
        slow = RyaStore.load(TINY)
        slow.rpc_latency_s = 0.001
        slow.ranges_per_rpc = 1
        out = slow.query("SELECT ?u ?t WHERE { ?u <likes> ?p . ?p <title> ?t . }")
        assert sorted(map(tuple, out.values)) == [("u1", "t1"), ("u2", "t1")]

    def test_probe_counts_harness(self, rya, triples_pd):
        from repro.bench.harness import rya_probe_counts

        table = rya_probe_counts(rya)
        assert len(table) == 20
        assert (table["probes"] > 0).all()
        assert rya.rpc_latency_s == 0.0  # restored
