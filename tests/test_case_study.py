"""Exp-8 stand-in: tspG on a synthetic transit schedule (SFMTA case study).

The paper's query ("Silver Ave" -> "30th St", [9:20, 9:30]) returns a tspG
of 8 stops and 17 trips.  On our synthetic schedule we verify the query
mechanics: the tspG is exact (vs brute force), every edge is a scheduled
trip, and transfers between lines appear.
"""
import pytest

from repro.core.vug import vug_local
from repro.graph.adjacency import TemporalAdjacency
from repro.graph.generators import transit_schedule_pdf
from repro.graph.schema import pdf_to_edge_list
from repro.workload import Query, generate_queries

from tests.reference import brute_tspg


@pytest.fixture(scope="module")
def transit():
    pdf = transit_schedule_pdf(seed=7)
    return TemporalAdjacency(pdf_to_edge_list(pdf))


def _case_query(adj):
    # A 10-minute window during service, like the paper's [9:20, 9:30].
    qs = generate_queries(adj, theta=11, n_queries=3, seed=3)
    return qs


def test_transit_tspg_exact(transit):
    for q in _case_query(transit):
        res = vug_local(transit, q)
        assert res.edges == brute_tspg(transit.edges, q.s, q.t, q.tb, q.te)


def test_transit_tspg_nonempty_and_within_window(transit):
    q = _case_query(transit)[0]
    res = vug_local(transit, q)
    assert res.edges
    assert all(q.tb <= ts <= q.te for _, _, ts in res.edges)


def test_transit_edges_are_scheduled_trips(transit):
    q = _case_query(transit)[0]
    res = vug_local(transit, q)
    assert set(res.edges) <= set(transit.edges)


def test_transit_some_query_offers_transfers(transit):
    """At least one query's tspG spans >= 2 hops (a transfer option)."""
    best = 0
    for q in generate_queries(transit, theta=15, n_queries=10, seed=5):
        res = vug_local(transit, q)
        verts = res.vertices
        if verts:
            best = max(best, len(verts))
    assert best >= 3
