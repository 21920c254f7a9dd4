"""Latency measurement helpers (paper Table 4 metric).

Latency of one imputation query = wall-clock of the full driver-side call:
graph search + inverse projection + simplification ("including its
simplification and reconstruction cost", §4.3.2). ``evaluate_gaps`` in
:mod:`repro.eval.metrics` records per-query latencies; this module provides
a standalone timer for callers that only need timing.
"""
from __future__ import annotations

import time
from typing import Callable

import numpy as np

from repro.ais.gaps import Gap


def time_queries(impute_fn: Callable, gaps: list[Gap]) -> dict:
    """Run every gap query once; return avg/max wall-clock seconds."""
    secs = []
    for g in gaps:
        t0 = time.perf_counter()
        impute_fn(g.start_lon, g.start_lat, g.end_lon, g.end_lat)
        secs.append(time.perf_counter() - t0)
    arr = np.asarray(secs)
    return {"avg_s": float(arr.mean()), "max_s": float(arr.max()), "n": int(arr.size)}
