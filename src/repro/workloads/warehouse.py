"""Synthetic progressive-data-warehouse workloads W-A and W-B.

The paper's case study (§8.3) runs 274 / 554 recurring daily jobs from
Alibaba's enterprise warehouse; those are proprietary, so we draw seeded
workloads from the same query-template family as the perf suite
(star joins over store_sales with optional pre-aggregated derived
tables), scaled ~20x down so the study executes for real on one
machine. The reported metrics (PDW/TDW cost ratios, reduction
percentages) are scale-free.
"""
from __future__ import annotations

import numpy as np

from repro.core.logical import Plan
from repro.workloads.queries import perf_query

#: paper workload sizes: W-A 274 queries, W-B 554 queries
SCALED_SIZES = {"W-A": 12, "W-B": 18}


def workload(name: str, seed: int | None = None) -> list[tuple[str, Plan]]:
    assert name in SCALED_SIZES
    g = np.random.default_rng(seed if seed is not None else hash(name) % 2**31)
    out = []
    for i in range(SCALED_SIZES[name]):
        n_joins = int(g.integers(2, 8))
        n_subq = int(g.integers(0, min(3, n_joins)))
        out.append((f"{name.lower()}-{i:02d}", perf_query(n_joins, n_subq)))
    return out
