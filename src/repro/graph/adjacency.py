"""Timestamp-sorted adjacency used by the per-query local kernels.

The paper's O(n+m) algorithms rely on neighbor lists sorted by timestamp with
monotone scan pointers (Alg. 3's "pointer in N_out(u)").  We store, per
vertex:

* ``out_desc[u]`` — out-neighbors ``(τ, v)`` sorted by **descending** τ: the
  earliest-arrival sweep consumes the admissible suffix ``τ > A(u)`` and
  since ``A(u)`` only decreases, the pointer over this order moves forward
  monotonically, touching each edge once.
* ``in_asc[u]`` — in-neighbors ``(τ, v)`` sorted by **ascending** τ: the
  latest-departure sweep consumes ``τ < D(u)``; ``D(u)`` only increases, so
  the ascending pointer is likewise monotone.

These two orders are also exactly what the optimized bidirectional DFS
(Alg. 7) needs: forward search explores out-neighbors in non-ascending
temporal order and backward search explores in-neighbors in non-descending
order.
"""
from __future__ import annotations

from collections import defaultdict
from typing import Dict, Iterable, List, Tuple

from repro.graph.schema import Edge


class TemporalAdjacency:
    """Immutable adjacency view of a temporal edge set."""

    def __init__(self, edges: Iterable[Edge]):
        self.edges: List[Edge] = sorted(set(edges))
        out: Dict[int, List[Tuple[int, int]]] = defaultdict(list)
        inc: Dict[int, List[Tuple[int, int]]] = defaultdict(list)
        verts = set()
        for u, v, ts in self.edges:
            out[u].append((ts, v))
            inc[v].append((ts, u))
            verts.add(u)
            verts.add(v)
        for u in out:
            out[u].sort(key=lambda p: (-p[0], p[1]))
        for v in inc:
            inc[v].sort()
        self.out_desc: Dict[int, List[Tuple[int, int]]] = dict(out)
        self.in_asc: Dict[int, List[Tuple[int, int]]] = dict(inc)
        # Ascending out-lists, cached: enumeration and the Dijkstra baseline
        # iterate them on every vertex visit.
        self._out_asc: Dict[int, List[Tuple[int, int]]] = {
            u: list(reversed(lst)) for u, lst in self.out_desc.items()
        }
        self.vertices = verts

    @property
    def n(self) -> int:
        return len(self.vertices)

    @property
    def m(self) -> int:
        return len(self.edges)

    def out_edges(self, u: int) -> List[Tuple[int, int]]:
        """Out-neighbors ``(τ, v)`` of ``u``, descending τ."""
        return self.out_desc.get(u, [])

    def in_edges(self, v: int) -> List[Tuple[int, int]]:
        """In-neighbors ``(τ, u)`` of ``v``, ascending τ."""
        return self.in_asc.get(v, [])

    def out_asc(self, u: int) -> List[Tuple[int, int]]:
        """Out-neighbors ``(τ, v)`` of ``u``, ascending τ (for enumeration)."""
        return self._out_asc.get(u, [])

    def max_degree(self) -> int:
        """d = max over vertices of max(in-degree, out-degree) (TABLE I)."""
        if not self.edges:
            return 0
        return max(
            max((len(l) for l in self.out_desc.values()), default=0),
            max((len(l) for l in self.in_asc.values()), default=0),
        )

    def window(self, tb: int, te: int) -> "TemporalAdjacency":
        """Adjacency of the projected graph within ``[tb, te]``."""
        return TemporalAdjacency(e for e in self.edges if tb <= e[2] <= te)
