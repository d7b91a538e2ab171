"""Unit tests for the benchmark harness (no Spark needed)."""
from __future__ import annotations

import os
import time

import pandas as pd

from repro.bench.harness import (
    dir_size,
    format_table,
    group_averages,
    query_times,
    time_query,
    timed,
)
from repro.sparql.watdiv_queries import QUERIES


class TestTimed:
    def test_returns_elapsed_and_result(self):
        secs, out = timed(lambda: 41 + 1)
        assert out == 42 and secs >= 0

    def test_measures_sleep(self):
        secs, _ = timed(lambda: time.sleep(0.05))
        assert secs >= 0.04

    def test_time_query_median(self):
        calls = []

        def run(q):
            calls.append(q)
            return 0

        t = time_query(run, "SELECT", rounds=3)
        assert len(calls) == 3 and t >= 0


class TestDirSize:
    def test_counts_bytes(self, tmp_path):
        (tmp_path / "a.bin").write_bytes(b"x" * 100)
        sub = tmp_path / "sub"
        sub.mkdir()
        (sub / "b.bin").write_bytes(b"y" * 50)
        assert dir_size(str(tmp_path)) == 150

    def test_empty_dir(self, tmp_path):
        assert dir_size(str(tmp_path)) == 0

    def test_missing_dir(self):
        assert dir_size(os.path.join("/tmp", "definitely-not-here-xyz")) == 0


class _StubSystem:
    def __init__(self, name, delay):
        self.name = name
        self.delay = delay
        self.run_query = self._run

    def _run(self, q):
        time.sleep(self.delay)
        return 1


class TestQueryTables:
    def stub_systems(self):
        return {
            "Fast": _StubSystem("Fast", 0.0),
            "Slow": _StubSystem("Slow", 0.002),
        }

    def test_query_times_shape(self):
        df = query_times(self.stub_systems(), rounds=1)
        assert list(df.columns) == ["query", "Fast", "Slow"]
        assert sorted(df["query"]) == sorted(QUERIES)

    def test_group_averages_shape_and_order(self):
        per_query = query_times(self.stub_systems(), rounds=1)
        table = group_averages(per_query)
        assert list(table["group"]) == ["Complex", "Snowflake", "Linear", "Star"]
        assert set(table.columns) == {"group", "Fast", "Slow"}

    def test_group_averages_math(self):
        per_query = pd.DataFrame(
            {
                "query": list(QUERIES),
                "X": [1.0] * len(QUERIES),
            }
        )
        table = group_averages(per_query)
        assert (table["X"] == 1000.0).all()  # 1 s -> 1000 ms

    def test_slow_system_measures_slower(self):
        per_query = query_times(self.stub_systems(), rounds=1)
        assert per_query["Slow"].mean() > per_query["Fast"].mean()


class TestFormatting:
    def test_format_table_contains_title_and_data(self):
        df = pd.DataFrame({"System": ["PRoST"], "Time": [1.0]})
        out = format_table(df, "Table 1")
        assert "== Table 1 ==" in out and "PRoST" in out

    def test_format_table_no_index_column(self):
        df = pd.DataFrame({"A": [1]})
        assert "\n0 " not in format_table(df, "t")
