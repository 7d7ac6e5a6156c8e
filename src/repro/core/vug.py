"""VUG orchestration (paper Alg. 1): QuickUBG → TightUBG → EEV.

``vug_local`` is the exact per-query kernel with per-phase wall timings —
the unit of work that the evaluation harness parallelizes across queries.
``vug_dataflow`` is the fully distributed pipeline (DataFrame in,
tspG-edge DataFrame out) built from the ``*_df`` phase implementations.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, List, Set

from pyspark.sql import DataFrame, SparkSession

from repro.core.eev import eev, eev_df
from repro.core.polarity import (
    arrival_times_df,
    departure_times_df,
    polarity_times,
)
from repro.core.quick_ubg import quick_ubg_df, quick_ubg_edges
from repro.core.tcv import (
    tcv_from_source,
    tcv_from_source_df,
    tcv_to_target,
    tcv_to_target_df,
)
from repro.core.tight_ubg import tight_ubg, tight_ubg_df
from repro.graph.adjacency import TemporalAdjacency
from repro.graph.schema import Edge
from repro.workload import Query


@dataclass
class VugLocalResult:
    """Exact tspG for one query plus phase timings and intermediate sizes."""

    edges: List[Edge]
    timings: Dict[str, float] = field(default_factory=dict)
    sizes: Dict[str, int] = field(default_factory=dict)

    @property
    def vertices(self) -> Set[int]:
        vs: Set[int] = set()
        for u, v, _ in self.edges:
            vs.add(u)
            vs.add(v)
        return vs


def vug_local(adj: TemporalAdjacency, q: Query) -> VugLocalResult:
    """Run the full VUG kernel for one query on a local adjacency."""
    t0 = time.perf_counter()
    A, D = polarity_times(adj, q.s, q.t, q.tb, q.te)
    gq = TemporalAdjacency(quick_ubg_edges(adj.edges, A, D))
    t1 = time.perf_counter()
    tcv_s = tcv_from_source(gq, q.s, q.t)
    tcv_t = tcv_to_target(gq, q.s, q.t)
    gt = tight_ubg(gq, q.s, q.t, tcv_s, tcv_t)
    t2 = time.perf_counter()
    edges = eev(gt, q.s, q.t, q.tb, q.te)
    t3 = time.perf_counter()
    return VugLocalResult(
        edges=edges,
        timings={"quick": t1 - t0, "tight": t2 - t1, "eev": t3 - t2},
        sizes={"gq": gq.m, "gt": gt.m, "tspg": len(edges)},
    )


def quick_ubg_dataflow(
    spark: SparkSession, edges: DataFrame, q: Query
) -> DataFrame:
    """Distributed QuickUBG: polarity fixpoints + Lemma-1 edge filter."""
    arrival = arrival_times_df(spark, edges, q.s, q.t, q.tb, q.te)
    departure = departure_times_df(spark, edges, q.s, q.t, q.tb, q.te)
    return quick_ubg_df(edges, arrival, departure)


def tight_ubg_dataflow(
    spark: SparkSession, gq: DataFrame, q: Query
) -> DataFrame:
    """Distributed TightUBG: TCV sweeps + Lemma-9 filter."""
    gq = gq.localCheckpoint(eager=True)
    tcv_s = tcv_from_source_df(spark, gq, q.s, q.t)
    tcv_t = tcv_to_target_df(spark, gq, q.s, q.t)
    return tight_ubg_df(gq, tcv_s, tcv_t, q.s, q.t)


def vug_dataflow(
    spark: SparkSession, edges: DataFrame, q: Query
) -> DataFrame:
    """Full distributed VUG pipeline; returns the tspG edge DataFrame."""
    gq = quick_ubg_dataflow(spark, edges, q)
    gt = tight_ubg_dataflow(spark, gq, q)
    return eev_df(spark, gt, q.s, q.t, q.tb, q.te)
