"""Benchmark fixtures: one WatDiv-lite graph at bench scale, loaded
once per session into every system (querying benchmarks share the
stores; the loading benchmark builds its own fresh ones)."""
from __future__ import annotations

import os

import pytest

BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))
BENCH_SEED = 42


@pytest.fixture(scope="session")
def bench_graph_pd():
    from repro.rdf.watdiv import watdiv_pandas

    return watdiv_pandas(scale=BENCH_SCALE, seed=BENCH_SEED)


@pytest.fixture(scope="session")
def bench_triples(spark, bench_graph_pd):
    from repro.rdf.triples import to_spark

    return to_spark(spark, bench_graph_pd).cache()


@pytest.fixture(scope="session")
def bench_systems(spark, bench_triples, bench_graph_pd, tmp_path_factory):
    from repro.bench.harness import load_all_systems

    base = str(tmp_path_factory.mktemp("bench_stores"))
    return load_all_systems(spark, bench_triples, bench_graph_pd, base)


@pytest.fixture(scope="session")
def bench_prost(bench_systems):
    return bench_systems["PRoST"].store
