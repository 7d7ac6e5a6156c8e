"""Synthetic temporal graph generators.

The paper evaluates on 10 real SNAP/KONECT temporal graphs which are not
available offline; ``temporal_graph_pdf`` produces a scaled synthetic
stand-in (see DESIGN.md §3 for the substitution argument):

* vertex popularity is Zipf-distributed with a *shared* permutation for
  sources and destinations: heavy senders are also heavy receivers, giving
  the dense communication core (large ``d`` in TABLE I) that real email /
  wiki-talk graphs have and that drives the enumeration blowup the paper
  exploits.  (With independent hub sets, hub→hub edges almost vanish and
  every tspG collapses to a handful of edges — measured during calibration.)
* timestamps are uniform integers on ``[1, n_ts]`` — per-window edge density
  is what the algorithms are sensitive to; the dataset catalog scales
  ``n_ts`` by √sf (see datasets.py) so a θ-window keeps paper-like absolute
  path richness after the ~100× edge downscaling.

``transit_schedule_pdf`` builds a small GTFS-like bus schedule (lines of
consecutive stops, trips departing on a cadence) for the SFMTA case study
(Exp-8).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.graph.schema import canonical_edges_pdf


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1, dtype="float64") ** alpha
    return w / w.sum()


def temporal_graph_pdf(
    *,
    n: int,
    m: int,
    n_ts: int,
    alpha: float = 1.3,
    seed: int = 0,
) -> pd.DataFrame:
    """Random directed temporal multigraph as a canonical edge table.

    ``m`` is a target; self-loops and duplicate ``(src, dst, ts)`` triples are
    dropped, so the realized edge count is slightly below the target on dense
    configurations.  Deterministic in ``seed``.
    """
    if n < 2:
        raise ValueError("need at least 2 vertices")
    g = np.random.default_rng(seed)
    w = _zipf_weights(n, alpha)
    # One shared popularity permutation: heavy senders are heavy receivers.
    ids = g.permutation(np.arange(n, dtype="int64"))
    # Oversample to compensate for dropped self-loops/duplicates.
    k = int(m * 1.25) + 16
    src = ids[g.choice(n, size=k, p=w)]
    dst = ids[g.choice(n, size=k, p=w)]
    ts = g.integers(1, n_ts + 1, size=k)
    pdf = canonical_edges_pdf(pd.DataFrame({"src": src, "dst": dst, "ts": ts}))
    if len(pdf) > m:
        # Deterministic thinning back to the target size.
        keep = g.permutation(len(pdf))[:m]
        pdf = pdf.iloc[np.sort(keep)].reset_index(drop=True)
    return pdf


def random_small_graph(
    *, n: int, m: int, n_ts: int, seed: int = 0
) -> pd.DataFrame:
    """Tiny near-uniform temporal graph for property tests and oracles."""
    g = np.random.default_rng(seed)
    k = m * 2 + 8
    pdf = pd.DataFrame(
        {
            "src": g.integers(0, n, size=k),
            "dst": g.integers(0, n, size=k),
            "ts": g.integers(1, n_ts + 1, size=k),
        }
    )
    pdf = canonical_edges_pdf(pdf)
    return pdf.iloc[:m].reset_index(drop=True)


def transit_schedule_pdf(
    *,
    n_lines: int = 12,
    stops_per_line: int = 8,
    trips_per_line: int = 30,
    start_minute: int = 8 * 60,
    headway: int = 6,
    hop_minutes: int = 2,
    n_hubs: int = 6,
    seed: int = 7,
) -> pd.DataFrame:
    """Synthetic GTFS-like schedule as a temporal graph (Exp-8 stand-in).

    Vertices are stops; an edge ``(u, v, τ)`` is a scheduled trip departing
    stop ``u`` at minute-of-day ``τ`` toward the next stop ``v`` on the line.
    Lines share ``n_hubs`` hub stops so that transfers exist, mirroring how
    SFMTA routes interconnect.
    """
    g = np.random.default_rng(seed)
    next_stop = n_hubs
    rows = []
    for line in range(n_lines):
        stops = []
        for i in range(stops_per_line):
            if g.random() < 0.35:
                stops.append(int(g.integers(0, n_hubs)))
            else:
                stops.append(next_stop)
                next_stop += 1
        # A line must not revisit a stop within one trip.
        seen, route = set(), []
        for st in stops:
            if st not in seen:
                seen.add(st)
                route.append(st)
        offset = int(g.integers(0, headway))
        for trip in range(trips_per_line):
            dep = start_minute + offset + trip * headway
            for a, b in zip(route, route[1:]):
                rows.append((a, b, dep))
                dep += hop_minutes
    return canonical_edges_pdf(pd.DataFrame(rows, columns=["src", "dst", "ts"]))
