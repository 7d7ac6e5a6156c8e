"""Polarity time computation (paper Alg. 3) — local kernel and dataflow.

``A(u)`` (earliest arrival) is the smallest arrival timestamp over temporal
paths ``s → u`` within ``[τb, τe]`` that do not pass through ``t``;
``D(u)`` (latest departure) is the largest departure timestamp over temporal
paths ``u → t`` within the window that do not pass through ``s``.
Conventions: ``A(s) = τb - 1``, ``D(t) = τe + 1``; unreachable vertices are
absent from the returned maps (paper: +∞ / −∞).

Local kernel: label-correcting BFS with monotone scan pointers over
timestamp-sorted neighbor lists.  ``A(u)`` only ever decreases, and the
admissible out-edges (``τ > A(u)``) form a growing suffix of the
descending-τ list, so a per-vertex pointer touches each edge once — the
paper's O(n+m) bound.

Dataflow: a min-fixpoint (resp. max-fixpoint) label propagation expressed as
iterative DataFrame joins.  Arrival strictly increases along a path, so the
fixpoint is reached in at most θ rounds; we also stop as soon as a round
changes nothing.
"""
from __future__ import annotations

from collections import deque
from typing import Dict, Tuple

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graph.adjacency import TemporalAdjacency


def _first_le_desc(lst, val: int) -> int:
    """First index of a τ-descending list with τ ≤ val (binary search)."""
    lo, hi = 0, len(lst)
    while lo < hi:
        mid = (lo + hi) // 2
        if lst[mid][0] > val:
            lo = mid + 1
        else:
            hi = mid
    return lo


def _first_ge_asc(lst, val: int) -> int:
    """First index of a τ-ascending list with τ ≥ val (binary search)."""
    lo, hi = 0, len(lst)
    while lo < hi:
        mid = (lo + hi) // 2
        if lst[mid][0] < val:
            lo = mid + 1
        else:
            hi = mid
    return lo


def arrival_times(
    adj: TemporalAdjacency,
    s: int,
    t: int,
    tb: int,
    te: int,
    blocked: frozenset = frozenset(),
) -> Dict[int, int]:
    """Earliest arrival A(·) from ``s`` avoiding ``t`` — paper Alg. 3, forward.

    Returns ``{u: A(u)}`` for every reachable ``u`` (including ``A(s)=τb-1``);
    ``t`` never receives a label (paths must not pass through it, Alg. 3 L6).
    On first visit the scan pointer starts past the τ > τe prefix (binary
    search) so out-of-window edges are never touched — the pointer then only
    moves forward, so each in-window edge is consumed once.

    ``blocked`` vertices are treated as absent (EEV uses this to bound
    reachability around a partially claimed path).
    """
    A: Dict[int, int] = {s: tb - 1}
    ptr: Dict[int, int] = {}
    q = deque([s])
    in_q = {s}
    inf = te + 1
    while q:
        u = q.popleft()
        in_q.discard(u)
        lst = adj.out_edges(u)  # descending τ
        i = ptr.get(u)
        if i is None:
            i = _first_le_desc(lst, te)
        au = A[u]
        n = len(lst)
        while i < n:
            ts, v = lst[i]
            if ts <= au:
                break  # remaining edges have τ ≤ A(u); resume if A(u) drops
            i += 1  # edge consumed permanently (A(u) only decreases)
            if v == t or v in blocked:
                continue
            if ts >= A.get(v, inf):
                continue
            A[v] = ts
            if ts != te and v not in in_q:
                q.append(v)
                in_q.add(v)
        ptr[u] = i
    return A


def departure_times(
    adj: TemporalAdjacency,
    s: int,
    t: int,
    tb: int,
    te: int,
    blocked: frozenset = frozenset(),
) -> Dict[int, int]:
    """Latest departure D(·) toward ``t`` avoiding ``s`` — Alg. 3, backward.

    Mirror of :func:`arrival_times`, including ``blocked`` semantics.
    """
    D: Dict[int, int] = {t: te + 1}
    ptr: Dict[int, int] = {}
    q = deque([t])
    in_q = {t}
    neg = tb - 1
    while q:
        u = q.popleft()
        in_q.discard(u)
        lst = adj.in_edges(u)  # ascending τ
        i = ptr.get(u)
        if i is None:
            i = _first_ge_asc(lst, tb)
        du = D[u]
        n = len(lst)
        while i < n:
            ts, v = lst[i]
            if ts >= du:
                break  # remaining edges have τ ≥ D(u); resume if D(u) grows
            i += 1
            if v == s or v in blocked:
                continue
            if ts <= D.get(v, neg):
                continue
            D[v] = ts
            if ts != tb and v not in in_q:
                q.append(v)
                in_q.add(v)
        ptr[u] = i
    return D


def polarity_times(
    adj: TemporalAdjacency, s: int, t: int, tb: int, te: int
) -> Tuple[Dict[int, int], Dict[int, int]]:
    """Both polarity maps (paper Alg. 3)."""
    return (
        arrival_times(adj, s, t, tb, te),
        departure_times(adj, s, t, tb, te),
    )


def _theta(tb: int, te: int) -> int:
    return te - tb + 1


def arrival_times_df(
    spark: SparkSession, edges: DataFrame, s: int, t: int, tb: int, te: int
) -> DataFrame:
    """Distributed A(·): columns ``(v, arrival)``, one row per reachable vertex.

    Each round relaxes every edge whose source already has a label:
    ``A(v) ← min(A(v), min{τ : e(u,v,τ), A(u) < τ ≤ τe, u ≠ t, v ≠ t})``.
    A temporal path makes one strict timestamp step per hop, so θ rounds
    suffice; the loop exits early at the first unchanged round.
    """
    win = edges.where(
        (F.col("ts") >= F.lit(int(tb))) & (F.col("ts") <= F.lit(int(te)))
    )
    win = win.where((F.col("src") != F.lit(int(t))) & (F.col("dst") != F.lit(int(t))))
    labels = spark.createDataFrame([(int(s), int(tb) - 1)], "v long, arrival long")
    labels = labels.localCheckpoint(eager=True)
    for _ in range(_theta(tb, te)):
        cand = (
            win.join(labels, win.src == labels.v)
            .where(F.col("ts") > F.col("arrival"))
            .groupBy(F.col("dst").alias("v"))
            .agg(F.min("ts").alias("cand"))
        )
        merged = (
            labels.join(cand, "v", "full_outer")
            .select(
                "v",
                F.least(
                    F.coalesce("arrival", F.lit(int(te) + 1)),
                    F.coalesce("cand", F.lit(int(te) + 1)),
                ).alias("arrival"),
            )
        )
        merged = merged.localCheckpoint(eager=True)
        # Converged when no vertex got a new/smaller label.
        changed = (
            merged.alias("m")
            .join(labels.alias("l"), "v", "left_anti")
            .count()
            + merged.alias("m")
            .join(labels.alias("l"), "v")
            .where(F.col("m.arrival") < F.col("l.arrival"))
            .count()
        )
        labels = merged
        if changed == 0:
            break
    return labels


def departure_times_df(
    spark: SparkSession, edges: DataFrame, s: int, t: int, tb: int, te: int
) -> DataFrame:
    """Distributed D(·): columns ``(v, departure)`` — mirror of arrival."""
    win = edges.where(
        (F.col("ts") >= F.lit(int(tb))) & (F.col("ts") <= F.lit(int(te)))
    )
    win = win.where((F.col("src") != F.lit(int(s))) & (F.col("dst") != F.lit(int(s))))
    labels = spark.createDataFrame([(int(t), int(te) + 1)], "v long, departure long")
    labels = labels.localCheckpoint(eager=True)
    for _ in range(_theta(tb, te)):
        cand = (
            win.join(labels, win.dst == labels.v)
            .where(F.col("ts") < F.col("departure"))
            .groupBy(F.col("src").alias("v"))
            .agg(F.max("ts").alias("cand"))
        )
        merged = (
            labels.join(cand, "v", "full_outer")
            .select(
                "v",
                F.greatest(
                    F.coalesce("departure", F.lit(int(tb) - 1)),
                    F.coalesce("cand", F.lit(int(tb) - 1)),
                ).alias("departure"),
            )
        )
        merged = merged.localCheckpoint(eager=True)
        changed = (
            merged.join(labels, "v", "left_anti").count()
            + merged.alias("m")
            .join(labels.alias("l"), "v")
            .where(F.col("m.departure") > F.col("l.departure"))
            .count()
        )
        labels = merged
        if changed == 0:
            break
    return labels
