"""Time-stream common vertices (paper Def. 5, Alg. 4).

``TCV_τ(s,u)`` is the set of vertices (except ``s``) shared by *all*
temporal simple paths ``s → u`` arriving by τ that avoid ``t``;
``TCV_τ(u,t)`` mirrors it for paths ``u → t`` departing at/after τ that
avoid ``s``.  By Lemma 6 they can be computed over temporal *walks*, which
admits the recursive sweep of Alg. 4:

    TCV_τ(s,u) = ∩ over in-edges (v,τ') of u with τ' ≤ τ of
                 (TCV_{τ'-1}(s,v) ∪ {u}),     TCV_.(s,s) = ∅.

Entries are stored only at the timestamps in ``T_in(u, Gq)`` (resp.
``T_out(u, Gq)``); Lemma 5 makes other timestamps a floor/ceiling lookup.
The sweep processes ``Gq`` edges in ascending (resp. descending) timestamp
order so that every looked-up entry is already final, and applies the
Lemma-7 pruning: once an entry collapses to ``{u}`` the vertex is
*completed* — all later (resp. earlier) entries would equal ``{u}``, and
the floor/ceiling lookup finding the stored ``{u}`` entry keeps lookups
transparent to the pruning.

Entry tables map ``u -> [(τ, frozenset), ...]`` with τ ascending for the
source side and descending for the target side (the order the sweep appends
in).  Lists are at most θ long, so lookups scan linearly.
"""
from __future__ import annotations

from typing import Dict, FrozenSet, List, Optional, Tuple

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graph.adjacency import TemporalAdjacency

TcvEntries = Dict[int, List[Tuple[int, FrozenSet[int]]]]

_EMPTY: FrozenSet[int] = frozenset()


def lookup_source(
    entries: TcvEntries, s: int, u: int, tau: int
) -> Optional[FrozenSet[int]]:
    """``TCV_τ(s,u)`` via Lemma 5: the entry with the largest stored τ' ≤ τ.

    ``None`` means no temporal path ``s → u`` arrives by τ (the intersection
    over an empty path set — "no constraint" does not arise for Gq edges).
    """
    if u == s:
        return _EMPTY
    for ts, vset in reversed(entries.get(u, [])):
        if ts <= tau:
            return vset
    return None


def lookup_target(
    entries: TcvEntries, t: int, u: int, tau: int
) -> Optional[FrozenSet[int]]:
    """``TCV_τ(u,t)``: the entry with the smallest stored τ' ≥ τ."""
    if u == t:
        return _EMPTY
    for ts, vset in reversed(entries.get(u, [])):  # stored descending
        if ts >= tau:
            return vset
    return None


def tcv_from_source(gq: TemporalAdjacency, s: int, t: int) -> TcvEntries:
    """Alg. 4 forward sweep: entries of ``TCV_.(s, ·)`` keyed by T_in(·, Gq)."""
    entries: TcvEntries = {}
    completed = set()
    for u_src, u_dst, ts in sorted(gq.edges, key=lambda e: (e[2], e[0], e[1])):
        u, v = u_dst, u_src  # edge e(v, u, τ) into u
        if u == t or u == s or u in completed:
            continue
        base = lookup_source(entries, s, v, ts - 1)
        if base is None:
            # Every Gq edge's source has an in-entry at A(v) ≤ τ-1 (Lemma 4);
            # reaching here means the input was not a genuine QuickUBG.
            raise AssertionError(f"no TCV entry for source {v} before {ts}")
        cand = base | {u}
        lst = entries.setdefault(u, [])
        if lst and lst[-1][0] == ts:
            lst[-1] = (ts, lst[-1][1] & cand)
        else:
            prev = lst[-1][1] if lst else None
            lst.append((ts, cand if prev is None else prev & cand))
        if lst[-1][1] == frozenset((u,)):
            completed.add(u)  # Lemma 7
    return entries


def tcv_to_target(gq: TemporalAdjacency, s: int, t: int) -> TcvEntries:
    """Alg. 4 backward sweep: entries of ``TCV_.(·, t)`` keyed by T_out(·, Gq)."""
    entries: TcvEntries = {}
    completed = set()
    for u_src, u_dst, ts in sorted(
        gq.edges, key=lambda e: (-e[2], e[0], e[1])
    ):
        u, v = u_src, u_dst  # edge e(u, v, τ) out of u
        if u == s or u == t or u in completed:
            continue
        base = lookup_target(entries, t, v, ts + 1)
        if base is None:
            raise AssertionError(f"no TCV entry for target {v} after {ts}")
        cand = base | {u}
        lst = entries.setdefault(u, [])
        if lst and lst[-1][0] == ts:
            lst[-1] = (ts, lst[-1][1] & cand)
        else:
            prev = lst[-1][1] if lst else None
            lst.append((ts, cand if prev is None else prev & cand))
        if lst[-1][1] == frozenset((u,)):
            completed.add(u)
    return entries


# ---------------------------------------------------------------------------
# Distributed dataflow version
# ---------------------------------------------------------------------------
#
# State: a DataFrame (u, ts, vset: array<long>) holding one row per entry.
# The sweep iterates the ≤ θ distinct window timestamps of Gq in order; each
# round is a pair of joins (floor-entry lookup via max_by / ceiling via
# min_by) plus a per-vertex intersection reduction using the higher-order
# aggregate over collected candidate arrays.  The Lemma-7 pruning is skipped
# (pure optimization): once an entry equals {u}, the recursion keeps it at
# {u} forever because every candidate contains u, so stored values agree
# with the kernel's *lookup* semantics at every timestamp.

_TCV_SCHEMA = "u long, ts long, vset array<long>"


def tcv_from_source_df(
    spark: SparkSession, gq: DataFrame, s: int, t: int
) -> DataFrame:
    """Distributed forward sweep; rows ``(u, ts, vset)`` for τ ∈ T_in(u, Gq)."""
    gq = gq.localCheckpoint(eager=True)
    ts_list = [r[0] for r in gq.select("ts").distinct().orderBy("ts").collect()]
    state = spark.createDataFrame([], _TCV_SCHEMA)
    for tau in ts_list:
        edges_t = gq.where(
            (F.col("ts") == F.lit(int(tau)))
            & (F.col("dst") != F.lit(int(t)))
            & (F.col("dst") != F.lit(int(s)))
        )
        prev = (
            state.where(F.col("ts") <= F.lit(int(tau) - 1))
            .groupBy("u")
            .agg(F.max_by("vset", "ts").alias("pset"))
        )
        src_prev = prev.select(F.col("u").alias("_pu"), F.col("pset").alias("_ps"))
        cand = (
            edges_t.join(src_prev, edges_t.src == src_prev._pu, "left")
            .select(
                F.col("dst").alias("_u"),
                F.when(
                    F.col("src") == F.lit(int(s)),
                    F.array().cast("array<long>"),
                )
                .otherwise(F.coalesce(F.col("_ps"), F.array(F.col("src"))))
                .alias("_base"),
            )
            .select(
                F.col("_u"),
                F.array_union("_base", F.array(F.col("_u"))).alias("_cand"),
            )
        )
        new_rows = (
            cand.groupBy("_u")
            .agg(F.collect_list("_cand").alias("_sets"))
            .select(
                F.col("_u").alias("u"),
                F.expr(
                    "aggregate(slice(_sets, 2, size(_sets) - 1), _sets[0],"
                    " (a, x) -> array_intersect(a, x))"
                ).alias("nset"),
            )
            .join(prev, "u", "left")
            .select(
                "u",
                F.lit(int(tau)).alias("ts"),
                F.when(F.col("pset").isNull(), F.col("nset"))
                .otherwise(F.array_intersect("pset", "nset"))
                .alias("vset"),
            )
        )
        state = state.unionByName(new_rows).localCheckpoint(eager=True)
    return state


def tcv_to_target_df(
    spark: SparkSession, gq: DataFrame, s: int, t: int
) -> DataFrame:
    """Distributed backward sweep; rows ``(u, ts, vset)`` for τ ∈ T_out(u, Gq)."""
    gq = gq.localCheckpoint(eager=True)
    ts_list = [
        r[0] for r in gq.select("ts").distinct().orderBy(F.desc("ts")).collect()
    ]
    state = spark.createDataFrame([], _TCV_SCHEMA)
    for tau in ts_list:
        edges_t = gq.where(
            (F.col("ts") == F.lit(int(tau)))
            & (F.col("src") != F.lit(int(s)))
            & (F.col("src") != F.lit(int(t)))
        )
        prev = (
            state.where(F.col("ts") >= F.lit(int(tau) + 1))
            .groupBy("u")
            .agg(F.min_by("vset", "ts").alias("pset"))
        )
        dst_prev = prev.select(F.col("u").alias("_pu"), F.col("pset").alias("_ps"))
        cand = (
            edges_t.join(dst_prev, edges_t.dst == dst_prev._pu, "left")
            .select(
                F.col("src").alias("_u"),
                F.when(
                    F.col("dst") == F.lit(int(t)),
                    F.array().cast("array<long>"),
                )
                .otherwise(F.coalesce(F.col("_ps"), F.array(F.col("dst"))))
                .alias("_base"),
            )
            .select(
                F.col("_u"),
                F.array_union("_base", F.array(F.col("_u"))).alias("_cand"),
            )
        )
        new_rows = (
            cand.groupBy("_u")
            .agg(F.collect_list("_cand").alias("_sets"))
            .select(
                F.col("_u").alias("u"),
                F.expr(
                    "aggregate(slice(_sets, 2, size(_sets) - 1), _sets[0],"
                    " (a, x) -> array_intersect(a, x))"
                ).alias("nset"),
            )
            .join(prev, "u", "left")
            .select(
                "u",
                F.lit(int(tau)).alias("ts"),
                F.when(F.col("pset").isNull(), F.col("nset"))
                .otherwise(F.array_intersect("pset", "nset"))
                .alias("vset"),
            )
        )
        state = state.unionByName(new_rows).localCheckpoint(eager=True)
    return state
