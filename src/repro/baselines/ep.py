"""EP* baselines (paper Sec. III-A): upper-bound reduction + enumeration.

``ep_run`` executes one baseline for one query: build the variant's
upper-bound graph, DFS-enumerate every temporal simple path on it, and
union the path edges into the tspG.  The expansion budget stands in for the
paper's 12-hour INF cutoff (DESIGN.md §3).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import List, Optional

from repro.baselines.enumeration import (
    EnumerationBudgetExceeded,
    tspg_by_enumeration,
)
from repro.baselines.reductions import dt_tsg, es_tsg, tg_tsg
from repro.graph.adjacency import TemporalAdjacency
from repro.graph.schema import Edge
from repro.workload import Query

EP_VARIANTS = ("EPdtTSG", "EPesTSG", "EPtgTSG")


@dataclass
class EpResult:
    """Outcome of one EP baseline run."""

    edges: List[Edge]
    n_paths: int
    n_ub: int       # edges in the variant's upper-bound graph
    ub_seconds: float
    enum_seconds: float
    inf: bool       # enumeration budget exhausted (paper: INF)

    @property
    def seconds(self) -> float:
        return self.ub_seconds + self.enum_seconds


def build_upper_bound(
    variant: str, adj: TemporalAdjacency, q: Query
) -> TemporalAdjacency:
    """The variant's upper-bound graph for a query."""
    if variant == "EPdtTSG":
        return dt_tsg(adj, q.tb, q.te)
    if variant == "EPesTSG":
        return es_tsg(adj, q.s, q.t, q.tb, q.te)
    if variant == "EPtgTSG":
        return tg_tsg(adj, q.s, q.t, q.tb, q.te)
    raise ValueError(f"unknown EP variant {variant!r}")


def ep_run(
    variant: str,
    adj: TemporalAdjacency,
    q: Query,
    max_expansions: Optional[int] = None,
) -> EpResult:
    """Run one EP baseline for one query."""
    t0 = time.perf_counter()
    ub = build_upper_bound(variant, adj, q)
    t1 = time.perf_counter()
    inf = False
    try:
        # materialize=True: the paper's baselines list all paths first, then
        # union them into the tspG (this drives their Exp-3 space profile).
        edges, n_paths = tspg_by_enumeration(
            ub, q.s, q.t, q.tb, q.te, max_expansions=max_expansions,
            materialize=True,
        )
    except EnumerationBudgetExceeded:
        edges, n_paths, inf = [], 0, True
    t2 = time.perf_counter()
    return EpResult(
        edges=edges,
        n_paths=n_paths,
        n_ub=ub.m,
        ub_seconds=t1 - t0,
        enum_seconds=t2 - t1,
        inf=inf,
    )
