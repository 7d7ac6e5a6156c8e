"""Shared knobs for pytest-benchmark suites.

Scale/queries come from the environment so a full paper-scale run and the
default quick run share code:

    REPRO_BENCH_SCALE    test | bench | <sf>      (default: bench)
    REPRO_BENCH_QUERIES  queries per dataset      (default: 8)
"""
from __future__ import annotations

import os


def bench_scale():
    v = os.environ.get("REPRO_BENCH_SCALE", "bench")
    return v if v in ("test", "bench") else float(v)


def bench_queries(default: int = 8) -> int:
    return int(os.environ.get("REPRO_BENCH_QUERIES", default))


def one_shot(benchmark, fn, *args, **kwargs):
    """Run ``fn`` exactly once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
