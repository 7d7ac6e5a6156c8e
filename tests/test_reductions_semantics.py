"""Semantic checks of the baseline reductions against path-level brute force.

esTSG keeps exactly the edges lying on some s→t path with *non-decreasing*
timestamps; tgTSG (== QuickUBG) keeps exactly the edges on some *strictly
ascending* temporal path.  Both are checked edge-by-edge against explicit
walk enumeration on small random graphs.
"""
from typing import List, Sequence, Set, Tuple

import numpy as np
import pytest

from repro.baselines.reductions import dt_tsg, es_tsg, tg_tsg
from repro.graph.adjacency import TemporalAdjacency
from repro.graph.generators import random_small_graph
from repro.graph.schema import pdf_to_edge_list

Edge = Tuple[int, int, int]


def _edges_on_paths(
    edges: Sequence[Edge], s: int, t: int, tb: int, te: int, strict: bool
) -> Set[Edge]:
    """Edges on some s→t temporal walk within the window (strict or not).

    Walk-based: an edge e(u,v,τ) qualifies iff some walk s→u arrives
    before (or at, non-strict) τ and some walk v→t departs after (or at) τ.
    Computed with two state fixpoints over (vertex, ts) pairs.
    """
    win = [e for e in edges if tb <= e[2] <= te]
    # forward states: (v, ts) = a walk from s arrives at v at time ts
    fwd: Set[Tuple[int, int]] = set()
    changed = True
    while changed:
        changed = False
        for u, v, ts in win:
            ok = u == s or any(
                w == u and (pt < ts if strict else pt <= ts) for w, pt in fwd
            )
            if ok and (v, ts) not in fwd:
                fwd.add((v, ts))
                changed = True
    bwd: Set[Tuple[int, int]] = set()
    changed = True
    while changed:
        changed = False
        for u, v, ts in win:
            ok = v == t or any(
                w == v and (pt > ts if strict else pt >= ts) for w, pt in bwd
            )
            if ok and (u, ts) not in bwd:
                bwd.add((u, ts))
                changed = True
    out = set()
    for u, v, ts in win:
        src_ok = u == s or any(
            w == u and (pt < ts if strict else pt <= ts) for w, pt in fwd
        )
        dst_ok = v == t or any(
            w == v and (pt > ts if strict else pt >= ts) for w, pt in bwd
        )
        if src_ok and dst_ok:
            out.add((u, v, ts))
    return out


def _case(seed: int):
    g = np.random.default_rng(seed + 7000)
    pdf = random_small_graph(
        n=int(g.integers(5, 10)), m=int(g.integers(10, 26)),
        n_ts=int(g.integers(3, 8)), seed=seed,
    )
    edges = pdf_to_edge_list(pdf)
    if not edges:
        pytest.skip("empty graph")
    adj = TemporalAdjacency(edges)
    verts = sorted(adj.vertices)
    s, t = verts[0], verts[-1]
    return adj, s, t, 1, 8


@pytest.mark.parametrize("seed", range(20))
def test_es_matches_nondecreasing_walk_semantics(seed):
    adj, s, t, tb, te = _case(seed)
    got = set(es_tsg(adj, s, t, tb, te).edges)
    want = _edges_on_paths(adj.edges, s, t, tb, te, strict=False)
    assert got == want


@pytest.mark.parametrize("seed", range(20))
def test_tg_contains_exactly_strict_path_edges_modulo_via_st(seed):
    """tgTSG (== QuickUBG) excludes paths through t (prefix) / s (suffix);
    on graphs where that matters it can only drop extra edges, never add."""
    adj, s, t, tb, te = _case(seed)
    got = set(tg_tsg(adj, s, t, tb, te).edges)
    want = _edges_on_paths(adj.edges, s, t, tb, te, strict=True)
    # via-s/via-t exclusion can only shrink the set
    assert got <= want
    # and any dropped edge must involve a via-t prefix or via-s suffix:
    # re-run the brute force on the graph with s-in/t-out edges removed.
    pruned = [
        e for e in adj.edges
        if not (e[1] == s or e[0] == t)
    ]
    want_excl = _edges_on_paths(pruned, s, t, tb, te, strict=True)
    assert got == want_excl


@pytest.mark.parametrize("seed", range(12))
def test_dt_is_exact_projection(seed):
    adj, s, t, tb, te = _case(seed)
    got = set(dt_tsg(adj, tb, te).edges)
    assert got == {e for e in adj.edges if tb <= e[2] <= te}
