"""Tests for the bundled WatDiv basic query set (shapes and metadata)."""
from __future__ import annotations

import pytest

from repro.rdf.watdiv import PREDICATES
from repro.sparql.algebra import is_const
from repro.sparql.parser import parse
from repro.sparql.watdiv_queries import GROUP_TITLES, GROUPS, QUERIES, QUERY_GROUP


def groups_of(query):
    keys = {}
    for tp in query.patterns:
        keys.setdefault(tp.subject_key(), []).append(tp)
    return keys


class TestInventory:
    def test_twenty_queries(self):
        assert len(QUERIES) == 20

    def test_group_sizes_match_paper(self):
        assert len(GROUPS["C"]) == 3
        assert len(GROUPS["F"]) == 5
        assert len(GROUPS["L"]) == 5
        assert len(GROUPS["S"]) == 7

    def test_groups_partition_queries(self):
        names = [q for g in GROUPS.values() for q in g]
        assert sorted(names) == sorted(QUERIES)

    def test_query_group_reverse_map(self):
        for g, names in GROUPS.items():
            for n in names:
                assert QUERY_GROUP[n] == g

    def test_group_titles(self):
        assert set(GROUP_TITLES) == set(GROUPS)


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_query_parses_and_validates(name):
    q = parse(QUERIES[name])
    q.validate()
    assert len(q.patterns) >= 2


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_query_predicates_are_generated(name):
    """Every predicate a query uses is one the generator emits."""
    q = parse(QUERIES[name])
    known = set(PREDICATES) | {"rdf:type"}
    for tp in q.patterns:
        assert tp.predicate in known


@pytest.mark.parametrize("name", GROUPS["S"])
def test_star_queries_share_one_subject(name):
    """Star queries: all patterns share one subject variable (S1/S4/S7
    may carry one extra pattern whose object is that subject)."""
    q = parse(QUERIES[name])
    keys = groups_of(q)
    biggest = max(len(v) for v in keys.values())
    assert biggest >= len(q.patterns) - 1


@pytest.mark.parametrize("name", GROUPS["L"])
def test_linear_queries_have_no_big_star(name):
    """Linear queries chain distinct subjects; no subject star ≥ 3."""
    q = parse(QUERIES[name])
    keys = groups_of(q)
    assert max(len(v) for v in keys.values()) <= 2


@pytest.mark.parametrize("name", ("C1", "C2") + GROUPS["F"])
def test_complex_and_snowflake_have_multiple_subjects(name):
    """C1/C2 and the snowflakes span several subjects; C3 is the one
    complex template that is a large single star (as in WatDiv)."""
    q = parse(QUERIES[name])
    assert len(groups_of(q)) >= 2


def test_c3_is_a_large_star():
    q = parse(QUERIES["C3"])
    assert len(groups_of(q)) == 1 and len(q.patterns) == 6


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_queries_are_connected(name):
    """Every query's join graph is connected (no cartesian products)."""
    q = parse(QUERIES[name])
    pats = list(q.patterns)
    reached = set(pats[0].variables())
    frontier = True
    remaining = pats[1:]
    while remaining and frontier:
        frontier = False
        for tp in list(remaining):
            if set(tp.variables()) & reached:
                reached |= set(tp.variables())
                remaining.remove(tp)
                frontier = True
    assert not remaining


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_every_query_has_a_constant_anchor(name):
    """Each WatDiv basic query carries at least one constant (the
    instantiated %vN% placeholder) — except C1/C3, which are
    unconstrained in the original templates too."""
    q = parse(QUERIES[name])
    has_const = any(
        is_const(tp.s) or is_const(tp.o) for tp in q.patterns
    )
    if name in ("C1", "C3"):
        assert not has_const
    else:
        assert has_const
