"""Benchmark regenerating **Table 1**: store size and loading time.

Each system loads the same WatDiv-lite graph into a fresh directory;
the benchmark time is the full loading phase (statistics + table
construction + on-disk persistence) and ``extra_info`` records the
resulting store size, i.e. both columns of the paper's Table 1.

Run with::

    pytest benchmarks/bench_table1_loading.py --benchmark-only
"""
from __future__ import annotations

import pytest

from repro.bench.harness import dir_size


@pytest.mark.benchmark(group="table1-loading")
def test_load_prost(benchmark, spark, bench_triples, tmp_path):
    from repro.core.prost import Prost

    path = str(tmp_path / "prost")
    benchmark.pedantic(
        lambda: Prost.load(spark, bench_triples, path=path), rounds=1, iterations=1
    )
    benchmark.extra_info["size_mb"] = round(dir_size(path) / 1e6, 2)


@pytest.mark.benchmark(group="table1-loading")
def test_load_s2rdf(benchmark, spark, bench_triples, tmp_path):
    from repro.baselines.s2rdf import S2RDFStore

    path = str(tmp_path / "s2rdf")
    benchmark.pedantic(
        lambda: S2RDFStore.load(spark, bench_triples, path=path), rounds=1, iterations=1
    )
    benchmark.extra_info["size_mb"] = round(dir_size(path) / 1e6, 2)


@pytest.mark.benchmark(group="table1-loading")
def test_load_rya(benchmark, spark, bench_triples, bench_graph_pd, tmp_path):
    from repro.baselines.rya import RyaStore

    path = str(tmp_path / "rya")
    benchmark.pedantic(
        lambda: RyaStore.load_distributed(
            spark, bench_triples, bench_graph_pd, path=path
        ),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["size_mb"] = round(dir_size(path) / 1e6, 2)


@pytest.mark.benchmark(group="table1-loading")
def test_load_sparqlgx(benchmark, spark, bench_triples, tmp_path):
    from repro.baselines.sparqlgx import SparqlGXStore

    path = str(tmp_path / "sparqlgx")
    benchmark.pedantic(
        lambda: SparqlGXStore.load(spark, bench_triples, path=path),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["size_mb"] = round(dir_size(path) / 1e6, 2)
