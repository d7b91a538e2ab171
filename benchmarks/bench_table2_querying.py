"""Benchmark regenerating **Table 2** (and the Figure 2/3 data).

One benchmark per (system, query): the 20 WatDiv queries on PRoST
(mixed), PRoST-VP (the Figure 2 baseline), S2RDF, Rya and SPARQLGX —
all against Parquet/text/index stores built from the same graph.
Averaging the per-query times inside each group (C/F/L/S) yields the
paper's Table 2 rows; ``jobs/table2_querying.py`` prints that summary
directly.

Run with::

    pytest benchmarks/bench_table2_querying.py --benchmark-only
"""
from __future__ import annotations

import pytest

from repro.sparql.watdiv_queries import QUERIES, QUERY_GROUP

QUERY_NAMES = sorted(QUERIES, key=lambda n: (QUERY_GROUP[n], n))


def _bench(benchmark, fn):
    benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)


@pytest.mark.parametrize("name", QUERY_NAMES)
@pytest.mark.benchmark(group="table2-prost")
def test_prost_mixed(benchmark, bench_systems, name):
    run = bench_systems["PRoST"].run_query
    benchmark.extra_info["group"] = QUERY_GROUP[name]
    _bench(benchmark, lambda: run(QUERIES[name]))


@pytest.mark.parametrize("name", QUERY_NAMES)
@pytest.mark.benchmark(group="table2-prost-vp")
def test_prost_vp_only(benchmark, bench_systems, name):
    """PRoST restricted to Vertical Partitioning — the Figure 2 baseline."""
    prost = bench_systems["PRoST"].store
    benchmark.extra_info["group"] = QUERY_GROUP[name]
    _bench(benchmark, lambda: prost.query(QUERIES[name], mode="vp").count())


@pytest.mark.parametrize("name", QUERY_NAMES)
@pytest.mark.benchmark(group="table2-s2rdf")
def test_s2rdf(benchmark, bench_systems, name):
    run = bench_systems["S2RDF"].run_query
    benchmark.extra_info["group"] = QUERY_GROUP[name]
    _bench(benchmark, lambda: run(QUERIES[name]))


@pytest.mark.parametrize("name", QUERY_NAMES)
@pytest.mark.benchmark(group="table2-rya")
def test_rya(benchmark, bench_systems, name):
    run = bench_systems["Rya"].run_query
    benchmark.extra_info["group"] = QUERY_GROUP[name]
    _bench(benchmark, lambda: run(QUERIES[name]))


@pytest.mark.parametrize("name", QUERY_NAMES)
@pytest.mark.benchmark(group="table2-sparqlgx")
def test_sparqlgx(benchmark, bench_systems, name):
    run = bench_systems["SPARQLGX"].run_query
    benchmark.extra_info["group"] = QUERY_GROUP[name]
    _bench(benchmark, lambda: run(QUERIES[name]))
