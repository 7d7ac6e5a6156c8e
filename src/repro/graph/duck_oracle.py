"""DuckDB recursive-CTE reference queries for temporal path semantics.

These SQL strings, run by :func:`repro.oracle.assert_equivalent` over an
``edges`` table, give an independent (non-Python, non-Spark) computation of:

* ``tspg_sql`` — the tspG edge set: enumerate every strict, vertex-simple
  temporal path ``s → t`` within ``[tb, te]`` and union the edges.  Path
  state carries the visited-vertex list, so the recursion is exponential —
  only use on tiny graphs (the oracle tests keep n ≤ ~14).
* ``arrival_sql`` / ``departure_sql`` — polarity times: reachable states
  ``(v, ts)`` under strict ascent avoiding ``t`` (resp. ``s``), reduced with
  MIN (resp. MAX).  ``UNION`` dedups states per round, so this one is
  polynomial.
"""
from __future__ import annotations


def tspg_sql(s: int, t: int, tb: int, te: int) -> str:
    """Edges of tspG as rows (src, dst, ts)."""
    return f"""
WITH RECURSIVE walk AS (
    SELECT dst AS cur, ts,
           [src, dst] AS vis,
           [[src, dst, ts]] AS path_edges
    FROM edges
    WHERE src = {s} AND ts BETWEEN {tb} AND {te}
  UNION ALL
    SELECT e.dst, e.ts,
           list_append(w.vis, e.dst),
           list_append(w.path_edges, [e.src, e.dst, e.ts])
    FROM walk w JOIN edges e
      ON e.src = w.cur AND e.ts > w.ts AND e.ts <= {te}
    WHERE w.cur <> {t} AND NOT list_contains(w.vis, e.dst)
)
SELECT DISTINCT pe[1] AS src, pe[2] AS dst, pe[3] AS ts
FROM (SELECT unnest(path_edges) AS pe FROM walk WHERE cur = {t})
"""


def arrival_sql(s: int, t: int, tb: int, te: int) -> str:
    """Earliest strict arrival from ``s`` avoiding ``t``: rows (v, arrival).

    Includes the convention row ``(s, tb-1)`` to match the kernel/dataflow.
    """
    return f"""
WITH RECURSIVE st AS (
    SELECT dst AS v, ts
    FROM edges
    WHERE src = {s} AND dst <> {t} AND ts BETWEEN {tb} AND {te}
  UNION
    SELECT e.dst, e.ts
    FROM st JOIN edges e
      ON e.src = st.v AND e.ts > st.ts AND e.ts <= {te}
    WHERE e.dst <> {t} AND e.src <> {t}
)
SELECT v, MIN(ts) AS arrival FROM st GROUP BY v
UNION ALL SELECT {s} AS v, {tb - 1} AS arrival
"""


def departure_sql(s: int, t: int, tb: int, te: int) -> str:
    """Latest strict departure toward ``t`` avoiding ``s``: rows (v, departure)."""
    return f"""
WITH RECURSIVE st AS (
    SELECT src AS v, ts
    FROM edges
    WHERE dst = {t} AND src <> {s} AND ts BETWEEN {tb} AND {te}
  UNION
    SELECT e.src, e.ts
    FROM st JOIN edges e
      ON e.dst = st.v AND e.ts < st.ts AND e.ts >= {tb}
    WHERE e.src <> {s} AND e.dst <> {s}
)
SELECT v, MAX(ts) AS departure FROM st GROUP BY v
UNION ALL SELECT {t} AS v, {te + 1} AS departure
"""
