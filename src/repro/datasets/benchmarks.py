"""Query benchmarks (paper §VIII-A2).

The paper samples query sets from each dataset: uniformly for DBLP and
Twitter (no skew), and per cardinality *interval* for OpenData and WDC so
the benchmark is not biased toward the abundant small sets. We mirror
that with intervals scaled to our dataset sizes (DESIGN.md §4).
"""
from __future__ import annotations

import numpy as np

from repro.datasets.generator import Collection

# Scaled analogues of the paper's intervals (OpenData: 10..32k in 6 bins,
# WDC: 10..11k in 5 bins).
INTERVALS: dict[str, list[tuple[int, int]]] = {
    "opendata": [(10, 40), (40, 80), (80, 160), (160, 320), (320, 801)],
    "wdc": [(5, 15), (15, 30), (30, 60), (60, 120), (120, 301)],
}


def uniform_queries(
    coll: Collection, *, n: int, seed: int = 7
) -> list[np.ndarray]:
    """n query sets drawn uniformly from the collection (DBLP/Twitter)."""
    g = np.random.default_rng(seed)
    idx = g.choice(coll.n_sets, size=min(n, coll.n_sets), replace=False)
    return [coll.sets[i] for i in idx]


def interval_queries(
    coll: Collection,
    *,
    per_interval: int,
    intervals: list[tuple[int, int]] | None = None,
    seed: int = 7,
) -> dict[tuple[int, int], list[np.ndarray]]:
    """Per-cardinality-interval query samples (OpenData/WDC).

    Returns interval -> query sets; intervals with no matching sets are
    dropped (scaled data may not populate the largest bin).
    """
    if intervals is None:
        intervals = INTERVALS[coll.name]
    g = np.random.default_rng(seed)
    sizes = np.array([len(s) for s in coll.sets])
    out: dict[tuple[int, int], list[np.ndarray]] = {}
    for lo, hi in intervals:
        pool = np.nonzero((sizes >= lo) & (sizes < hi))[0]
        if len(pool) == 0:
            continue
        idx = g.choice(pool, size=min(per_interval, len(pool)), replace=False)
        out[(lo, hi)] = [coll.sets[i] for i in idx]
    return out
