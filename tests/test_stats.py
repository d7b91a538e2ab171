"""Tests for the loading-phase statistics (paper §3.3)."""
from __future__ import annotations

from repro.core.stats import GraphStats, PredicateStats


class TestAgainstPandas:
    def test_counts_match_pandas(self, graph_stats, triples_pd):
        expected = triples_pd.groupby("p").size().to_dict()
        got = {p: st.n_triples for p, st in graph_stats.by_predicate.items()}
        assert got == expected

    def test_distinct_subjects_match_pandas(self, graph_stats, triples_pd):
        expected = triples_pd.groupby("p")["s"].nunique().to_dict()
        got = {p: st.n_distinct_subjects for p, st in graph_stats.by_predicate.items()}
        assert got == expected

    def test_predicates_sorted(self, graph_stats):
        preds = graph_stats.predicates()
        assert preds == sorted(preds)

    def test_contains_and_getitem(self, graph_stats):
        assert "wsdbm:likes" in graph_stats
        assert graph_stats["wsdbm:likes"].n_triples > 0

    def test_missing_predicate_zero(self, graph_stats):
        assert "nope:never" not in graph_stats
        assert graph_stats.n_triples("nope:never") == 0
        assert graph_stats.n_distinct_subjects("nope:never") == 0

    def test_multi_valued_detection(self, graph_stats, triples_pd):
        sizes = triples_pd.groupby(["p", "s"]).size()
        expected = set(sizes[sizes > 1].index.get_level_values("p"))
        assert graph_stats.multi_valued() == expected

    def test_known_multi_valued(self, graph_stats):
        mv = graph_stats.multi_valued()
        assert {"wsdbm:likes", "wsdbm:friendOf", "wsdbm:hasGenre"} <= mv

    def test_known_single_valued(self, graph_stats):
        mv = graph_stats.multi_valued()
        assert "gn:parentCountry" not in mv
        assert "wsdbm:userId" not in mv


class TestPredicateStats:
    def test_avg_multiplicity(self):
        assert PredicateStats(10, 5).avg_multiplicity == 2.0

    def test_avg_multiplicity_no_zero_division(self):
        assert PredicateStats(0, 0).avg_multiplicity == 0.0
