"""Per-query metric collection and workload runners.

``query_metrics`` runs one algorithm for one query on a local adjacency and
returns a flat metric dict (wide schema shared by all algorithms, unused
fields NaN/-1).  ``run_workload_local`` loops in-process;
``run_workload_spark`` parallelizes the (query × algorithm) grid across the
cluster with ``applyInPandas``, broadcasting the edge list and measuring
phase times inside the tasks — the paper's "total query time over 1000
queries" is then the sum of in-task times.
"""
from __future__ import annotations

import math
import time
from typing import Dict, Optional, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.enumeration import (
    EnumerationBudgetExceeded,
    count_paths,
    tspg_by_enumeration,
)
from repro.baselines.ep import EP_VARIANTS, ep_run
from repro.baselines.reductions import dt_tsg, es_tsg, tg_tsg
from repro.core.eev import eev
from repro.core.polarity import polarity_times
from repro.core.quick_ubg import quick_ubg_edges
from repro.core.tight_ubg import tight_ubg
from repro.core.vug import vug_local
from repro.graph.adjacency import TemporalAdjacency
from repro.workload import Query, queries_to_pdf

METRIC_SPARK_SCHEMA = (
    "qid long, algo string, inf long, total_s double, quick_s double,"
    " tight_s double, eev_s double, ub_s double, enum_s double, tg_s double,"
    " n_ub long, n_gq long, n_gt long, n_tspg long, n_paths long,"
    " paths_capped long, n_dt long, n_es long, n_tg long"
)

_METRIC_DEFAULTS: Dict[str, object] = {
    "inf": 0,
    "total_s": math.nan,
    "quick_s": math.nan,
    "tight_s": math.nan,
    "eev_s": math.nan,
    "ub_s": math.nan,
    "enum_s": math.nan,
    "tg_s": math.nan,
    "n_ub": -1,
    "n_gq": -1,
    "n_gt": -1,
    "n_tspg": -1,
    "n_paths": -1,
    "paths_capped": 0,
    "n_dt": -1,
    "n_es": -1,
    "n_tg": -1,
}

# Enumeration budgets standing in for the paper's 12-hour INF cutoff
# (~1-2 s of Python DFS per capped query at bench scale).
DEFAULT_MAX_EXPANSIONS = 500_000
DEFAULT_MAX_PATHS = 500_000


def query_metrics(
    adj: TemporalAdjacency,
    q: Query,
    algo: str,
    *,
    max_expansions: int = DEFAULT_MAX_EXPANSIONS,
    max_paths: int = DEFAULT_MAX_PATHS,
) -> Dict[str, object]:
    """Run ``algo`` for one query; see module docstring for the schema."""
    row = dict(_METRIC_DEFAULTS)
    row["algo"] = algo
    if algo == "VUG":
        res = vug_local(adj, q)
        row.update(
            quick_s=res.timings["quick"],
            tight_s=res.timings["tight"],
            eev_s=res.timings["eev"],
            total_s=sum(res.timings.values()),
            n_gq=res.sizes["gq"],
            n_gt=res.sizes["gt"],
            n_tspg=res.sizes["tspg"],
        )
    elif algo in EP_VARIANTS:
        res = ep_run(algo, adj, q, max_expansions=max_expansions)
        row.update(
            inf=int(res.inf),
            ub_s=res.ub_seconds,
            enum_s=res.enum_seconds,
            total_s=res.seconds,
            n_ub=res.n_ub,
            n_tspg=len(res.edges),
            n_paths=res.n_paths,
        )
    elif algo == "RATIOS":
        # Sizes of the five upper-bound graphs plus the exact tspG; also
        # times tgTSG vs QuickUBG (Exp-5) since both are computed anyway.
        t0 = time.perf_counter()
        tg = tg_tsg(adj, q.s, q.t, q.tb, q.te)
        t1 = time.perf_counter()
        A, D = polarity_times(adj, q.s, q.t, q.tb, q.te)
        gq = TemporalAdjacency(quick_ubg_edges(adj.edges, A, D))
        t2 = time.perf_counter()
        gt = tight_ubg(gq, q.s, q.t)
        t3 = time.perf_counter()
        tspg = eev(gt, q.s, q.t, q.tb, q.te)
        row.update(
            tg_s=t1 - t0,
            quick_s=t2 - t1,
            tight_s=t3 - t2,
            n_dt=dt_tsg(adj, q.tb, q.te).m,
            n_es=es_tsg(adj, q.s, q.t, q.tb, q.te).m,
            n_tg=tg.m,
            n_gq=gq.m,
            n_gt=gt.m,
            n_tspg=len(tspg),
        )
    elif algo == "EXP6":
        # EEV vs enumeration, both applied to the same Gt (paper Exp-6).
        A, D = polarity_times(adj, q.s, q.t, q.tb, q.te)
        gq = TemporalAdjacency(quick_ubg_edges(adj.edges, A, D))
        gt = tight_ubg(gq, q.s, q.t)
        t0 = time.perf_counter()
        tspg = eev(gt, q.s, q.t, q.tb, q.te)
        t1 = time.perf_counter()
        inf = 0
        try:
            tspg_by_enumeration(
                gt, q.s, q.t, q.tb, q.te, max_expansions=max_expansions
            )
        except EnumerationBudgetExceeded:
            inf = 1
        t2 = time.perf_counter()
        row.update(
            inf=inf,
            eev_s=t1 - t0,
            enum_s=t2 - t1,
            n_gt=gt.m,
            n_tspg=len(tspg),
        )
    elif algo == "COUNT":
        # tspG size and (capped) simple-path count (paper Exp-7), counted on
        # the tspG itself — every enumerated path lies inside it.
        res = vug_local(adj, q)
        tspg_adj = TemporalAdjacency(res.edges)
        n_paths, capped = count_paths(
            tspg_adj, q.s, q.t, q.tb, q.te, max_paths=max_paths
        )
        row.update(
            n_tspg=len(res.edges),
            n_paths=n_paths,
            paths_capped=int(capped),
            total_s=sum(res.timings.values()),
        )
    else:
        raise ValueError(f"unknown algorithm {algo!r}")
    return row


def run_workload_local(
    adj: TemporalAdjacency,
    queries: Sequence[Query],
    algos: Sequence[str],
    **caps,
) -> pd.DataFrame:
    """Run the (query × algorithm) grid sequentially in-process."""
    rows = []
    for qid, q in enumerate(queries):
        for algo in algos:
            row = query_metrics(adj, q, algo, **caps)
            row["qid"] = qid
            rows.append(row)
    return pd.DataFrame(rows)


def run_workload_spark(
    spark: SparkSession,
    edges_pdf: pd.DataFrame,
    queries: Sequence[Query],
    algos: Sequence[str],
    *,
    n_groups: Optional[int] = None,
    **caps,
) -> pd.DataFrame:
    """Distribute the (query × algorithm) grid across the cluster.

    Each Spark task rebuilds the adjacency once from the broadcast edge
    list, then runs its share of (query, algo) cells, so per-phase timings
    are measured in-task and summable like the paper's totals.
    """
    if n_groups is None:
        n_groups = max(2, spark.sparkContext.defaultParallelism)
    qpdf = queries_to_pdf(list(queries))
    grid = qpdf.merge(pd.DataFrame({"algo": list(algos)}), how="cross")
    # Round-robin over the grid spreads heavy algos across groups.
    grid["gid"] = np.arange(len(grid), dtype="int64") % n_groups
    edges_bc = spark.sparkContext.broadcast(
        (
            edges_pdf["src"].to_numpy("int64"),
            edges_pdf["dst"].to_numpy("int64"),
            edges_pdf["ts"].to_numpy("int64"),
        )
    )

    def run_group(pdf: pd.DataFrame) -> pd.DataFrame:
        src, dst, ts = edges_bc.value
        adj = TemporalAdjacency(zip(src.tolist(), dst.tolist(), ts.tolist()))
        rows = []
        for rec in pdf.itertuples(index=False):
            q = Query(int(rec.s), int(rec.t), int(rec.tb), int(rec.te))
            row = query_metrics(adj, q, str(rec.algo), **caps)
            row["qid"] = int(rec.qid)
            rows.append(row)
        out = pd.DataFrame(rows)
        return out[
            [f.split()[0] for f in METRIC_SPARK_SCHEMA.split(", ")]
        ]

    sdf = spark.createDataFrame(grid)
    return (
        sdf.groupBy("gid")
        .applyInPandas(run_group, schema=METRIC_SPARK_SCHEMA)
        .toPandas()
    )
