"""Catalog of the paper's 10 datasets (TABLE I) and their synthetic stand-ins.

Each :class:`DatasetSpec` records the statistics the paper reports in
TABLE I (Appendix C) plus the default query-window span θ used in the
evaluation.  ``make_dataset`` materializes a scaled synthetic graph with
``sf = target_m / paper_m``:

* ``n`` and ``m`` are multiplied by ``sf`` (preserving the m/n density);
* ``|T|`` is multiplied by ``sf^0.45`` (floored at 2θ) while θ keeps the
  paper's value.  Keeping |T| unscaled was measured to collapse every tspG
  to a handful of edges: a θ-window then holds ~sf× fewer edges in absolute
  terms and temporal-path richness dies exponentially with that count.  The
  sub-√sf compromise restores paper-like per-query behaviour (tspGs with
  hundreds of edges, path counts orders of magnitude above edge counts,
  enumeration baselines blowing up) at the scaled size without tipping the
  densest sets (D10) into pathological window coverage — see DESIGN.md §3.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List

import pandas as pd

from repro.graph.generators import temporal_graph_pdf

# Target realized edge counts per scale tier.
SCALE_TARGET_M = {"test": 1500, "bench": 40_000}
_MIN_N = 60


@dataclass(frozen=True)
class DatasetSpec:
    """One row of the paper's TABLE I."""

    key: str            # D1..D10
    name: str           # SNAP/KONECT dataset name
    n: int              # |V| in the paper
    m: int              # |E| in the paper
    n_ts: int           # |T| in the paper
    d: int              # max degree in the paper
    theta: int          # default θ used in the evaluation

    def scaled(self, scale) -> Dict[str, int]:
        """Synthetic generator parameters for a scale tier or explicit sf."""
        if isinstance(scale, str):
            sf = SCALE_TARGET_M[scale] / self.m
        else:
            sf = float(scale)
        sf = min(sf, 1.0)
        return {
            "n": max(_MIN_N, int(round(self.n * sf))),
            "m": max(200, int(round(self.m * sf))),
            "n_ts": max(2 * self.theta, int(round(self.n_ts * sf**0.45))),
        }


DATASETS: Dict[str, DatasetSpec] = {
    s.key: s
    for s in [
        DatasetSpec("D1", "email-Eu-core", 1_005, 332_334, 803, 9_782, 10),
        DatasetSpec("D2", "sx-mathoverflow", 88_581, 506_550, 2_350, 5_931, 20),
        DatasetSpec("D3", "sx-askubuntu", 159_316, 964_437, 2_613, 8_729, 20),
        DatasetSpec("D4", "sx-superuser", 194_085, 1_443_339, 2_773, 26_996, 20),
        DatasetSpec("D5", "wiki-ru", 457_018, 2_282_055, 4_715, 188_103, 25),
        DatasetSpec("D6", "wiki-de", 519_404, 6_729_794, 5_599, 395_780, 25),
        DatasetSpec("D7", "wiki-talk", 1_140_149, 7_833_140, 2_320, 264_905, 20),
        DatasetSpec("D8", "flickr", 2_302_926, 33_140_017, 196, 34_174, 10),
        DatasetSpec("D9", "sx-stackoverflow", 6_024_271, 63_497_050, 2_776, 101_663, 20),
        DatasetSpec("D10", "wikipedia", 2_166_670, 86_337_879, 3_787, 218_465, 25),
    ]
}

DATASET_KEYS: List[str] = list(DATASETS)


def make_dataset(key: str, *, scale="test", seed: int = 0) -> pd.DataFrame:
    """Generate the synthetic stand-in edge table for dataset ``key``.

    Deterministic in ``(key, scale, seed)``; the per-dataset seed offset keeps
    D1..D10 structurally independent.
    """
    spec = DATASETS[key]
    params = spec.scaled(scale)
    return temporal_graph_pdf(
        seed=seed * 1009 + int(key[1:]), alpha=1.05, **params
    )


def measured_stats(pdf: pd.DataFrame) -> Dict[str, int]:
    """|V|, |E|, |T|, d of a generated edge table (our TABLE I columns)."""
    from repro.graph.adjacency import TemporalAdjacency
    from repro.graph.schema import pdf_to_edge_list

    adj = TemporalAdjacency(pdf_to_edge_list(pdf))
    return {
        "n": adj.n,
        "m": adj.m,
        "n_ts": int(pdf["ts"].nunique()),
        "d": adj.max_degree(),
    }
