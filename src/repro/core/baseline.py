"""The paper's baseline (§VIII-A4): verify every candidate set.

The baseline shares Koios's candidate generation (token stream + inverted
index: any set with at least one alpha-edge) but computes the exact
bipartite matching for *all* candidates — no bounds, no filters. The
paper parallelizes the matchings with a thread pool; our distributed
equivalent lives in ``core.spark_search`` (the kernel here is the
per-partition unit of work).

``Baseline+`` additionally enables the iUB-Filter during refinement —
the paper needs it to make WDC feasible at all.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.core.koios import SearchResult, koios_search
from repro.matching.hungarian import max_weight_matching
from repro.semsim.inverted import build_inverted
from repro.semsim.simfn import sim_alpha
from repro.semsim.stream import stream_pairs


@dataclass
class BaselineResult:
    topk: list[tuple[int, float]]
    candidates: int
    em_full: int
    refine_seconds: float
    post_seconds: float
    peak_bytes: int
    timed_out: bool


def baseline_search(
    query_ids: np.ndarray,
    sets: list[np.ndarray],
    sims: np.ndarray,
    *,
    k: int,
    alpha: float,
    inverted: dict[int, np.ndarray] | None = None,
    time_budget: float | None = None,
) -> BaselineResult:
    """Exact top-k with full verification of every candidate."""
    t0 = time.perf_counter()
    w_alpha = sim_alpha(sims, alpha)
    if inverted is None:
        inverted = build_inverted(sets)
    candidates: set[int] = set()
    for _, tok, _ in stream_pairs(sims, query_ids, alpha):
        for sid in inverted.get(tok, ()):
            candidates.add(int(sid))
    t_refine = time.perf_counter() - t0

    timed_out = False
    scored: list[tuple[int, float]] = []
    t1 = time.perf_counter()
    for sid in sorted(candidates):
        if time_budget is not None and time.perf_counter() - t0 > time_budget:
            timed_out = True
            break
        res = max_weight_matching(w_alpha[:, sets[sid]])
        assert res.score is not None
        if res.score > 0:
            scored.append((sid, res.score))
    scored.sort(key=lambda x: (-x[1], x[0]))
    inv_bytes = sum(64 + 8 * len(v) for v in inverted.values())
    return BaselineResult(
        topk=scored[:k],
        candidates=len(candidates),
        em_full=len(scored),
        refine_seconds=t_refine,
        post_seconds=time.perf_counter() - t1,
        peak_bytes=int(sims.nbytes + inv_bytes + 16 * len(candidates)),
        timed_out=timed_out,
    )


def baseline_plus_search(
    query_ids: np.ndarray,
    sets: list[np.ndarray],
    sims: np.ndarray,
    *,
    k: int,
    alpha: float,
    inverted: dict[int, np.ndarray] | None = None,
    time_budget: float | None = None,
) -> SearchResult:
    """Baseline+ (§VIII-A4): refinement with the iUB-Filter activated,
    then a full exact matching for every survivor (no post-processing
    filters). The paper needs this variant to make WDC feasible."""
    return koios_search(
        query_ids,
        sets,
        sims,
        k=k,
        alpha=alpha,
        ub_mode="sound",
        post_filters=False,
        inverted=inverted,
        time_budget=time_budget,
    )
