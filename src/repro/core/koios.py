"""The Koios kernel: refinement (Algorithm 1) + post-processing (Algorithm 2).

This is the single-partition search engine. The distributed layer
(``core.spark_search``) runs one kernel per repository partition via
``applyInPandas`` and merges the per-partition top-k lists (paper §VI).

The kernel returns both the top-k result and per-filter statistics, which
are what Tables II, IV and V of the paper report:

* ``candidates``           — sets surfaced by the token stream (non-zero SO);
* ``iub_filtered``         — pruned during refinement by the (i)UB-filter;
* ``no_em``                — post-processing sets whose exact matching was
                             skipped thanks to bounds: Lemma-7 guaranteed
                             result members plus survivors whose UB never
                             ranked in the top-k-by-UB list (implicitly
                             pruned with no matching work — see
                             EXPERIMENTS.md accounting note);
* ``em_early_terminated``  — Hungarian runs aborted by the label-sum bound
                             (Lemma 8);
* ``em_full``              — exact matchings computed to completion.

``candidates == iub_filtered + no_em + em_early_terminated + em_full``
always holds, matching the row arithmetic of the paper's Tables IV/V.

Soundness note (``ub_mode``)
----------------------------
Lemma 6 of the paper bounds ``SO(C) <= S + min(|Q|-l, |C|-l) * s`` where S
is the partial *greedy* matching score. This is **not a valid upper bound
in general**: the optimal matching may drop a greedy edge and instead use
two previously streamed edges that the greedy rejected, each heavier than
the current stream similarity ``s`` (see
``tests/test_lemma6_counterexample.py`` for a concrete 3x3 instance).
We therefore support two modes:

* ``ub_mode="paper"`` — Lemma 6 verbatim, reproducing the paper's filter
  behavior and pruning counts;
* ``ub_mode="sound"`` (default) — a corrected incremental bound: since the
  stream is descending, the first ``c = min(|Q|, |C|)`` edges of C seen
  are its heaviest, so ``SO(C) <= W_head + max(0, c - n_e) * s`` where
  ``W_head`` sums the first ``min(c, n_e)`` seen edge weights. This
  relaxes the one-to-one constraint, hence is provably valid, at slightly
  weaker pruning power.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Literal

import numpy as np

from repro.core.bounds import UBBuckets
from repro.core.topk import TopKLowerBounds
from repro.matching.hungarian import max_weight_matching
from repro.semsim.inverted import build_inverted
from repro.semsim.simfn import sim_alpha
from repro.semsim.stream import stream_pairs

UBMode = Literal["paper", "sound"]


@dataclass
class KoiosStats:
    """Per-query filter / timing / memory statistics."""

    candidates: int = 0
    iub_filtered: int = 0
    no_em: int = 0
    em_early_terminated: int = 0
    em_full: int = 0
    refine_seconds: float = 0.0
    post_seconds: float = 0.0
    peak_bytes: int = 0
    timed_out: bool = False

    @property
    def survivors(self) -> int:
        """Sets that reached post-processing."""
        return self.candidates - self.iub_filtered


@dataclass
class SearchResult:
    """Top-k result: (set_id, score) descending; ``exact`` marks entries
    whose score is a proven exact SO (False only for Lemma-7-guaranteed
    sets when ``finalize_scores=False``, whose score is then their LB)."""

    topk: list[tuple[int, float]]
    exact: list[bool]
    stats: KoiosStats
    theta_lb: float = 0.0


@dataclass
class _Cand:
    """Per-candidate refinement state."""

    cap: int  # c = min(|Q|, |C|): max matching cardinality
    greedy: float = 0.0  # S: partial greedy matching score (the LB)
    n_edges: int = 0  # incident stream edges seen so far
    w_head: float = 0.0  # sum of the first min(cap, n_edges) edge weights
    matched_q: set[int] = field(default_factory=set)
    matched_t: set[int] = field(default_factory=set)

    def bucket_key(self, mode: UBMode) -> tuple[float, int]:
        """(score, m) as stored in the UB buckets for ``mode``."""
        if mode == "paper":
            l = len(self.matched_q)
            return self.greedy, self.cap - l
        return self.w_head, max(0, self.cap - self.n_edges)

    def upper_bound(self, mode: UBMode, s: float) -> float:
        score, m = self.bucket_key(mode)
        return score + m * s


def koios_search(
    query_ids: np.ndarray,
    sets: list[np.ndarray],
    sims: np.ndarray,
    *,
    k: int,
    alpha: float,
    ub_mode: UBMode = "sound",
    theta_seed: float = 0.0,
    finalize_scores: bool = True,
    post_filters: bool = True,
    inverted: dict[int, np.ndarray] | None = None,
    time_budget: float | None = None,
) -> SearchResult:
    """Exact top-k semantic overlap search over one repository partition.

    Args:
        query_ids: vocabulary ids of the query tokens.
        sets: the repository — one int64 token-id array per set.
        sims: exact (|Q|, |D|) similarity of the query tokens against the
            vocabulary (NOT yet alpha-thresholded).
        k: result size.
        alpha: element-similarity threshold of Def. 1.
        ub_mode: "paper" (Lemma 6 verbatim) or "sound" (corrected bound) —
            see module docstring.
        theta_seed: initial theta_lb, e.g. a global bound shared across
            partitions (§VI). Any value <= theta_k* preserves exactness.
        finalize_scores: compute exact SO for Lemma-7-guaranteed result
            sets after the search (extra matchings, not counted in stats)
            so results merge exactly across partitions.
        post_filters: disable to verify every refinement survivor with a
            full exact matching (no No-EM / EM-ETM) — this is the paper's
            Baseline+ (§VIII-A4).
        inverted: prebuilt inverted index (built on the fly otherwise,
            as in the paper).
        time_budget: per-query wall-clock budget in seconds (the paper
            uses 2500 s); on expiry the partial result is returned with
            ``stats.timed_out`` set.
    """
    t_start = time.perf_counter()
    nq = len(query_ids)
    stats = KoiosStats()
    w_alpha = sim_alpha(sims, alpha)
    if inverted is None:
        inverted = build_inverted(sets)

    # ---------------- refinement (Algorithm 1) ----------------
    stream = stream_pairs(sims, query_ids, alpha)
    llb = TopKLowerBounds(k, seed_threshold=theta_seed)
    buckets = UBBuckets()
    cand: dict[int, _Cand] = {}
    pruned: set[int] = set()
    last_s = 1.0

    for tup_no, (qi, tok, s) in enumerate(stream):
        last_s = s
        for sid in inverted.get(tok, ()):
            sid = int(sid)
            if sid in pruned:
                continue
            st = cand.get(sid)
            if st is None:
                st = _Cand(cap=min(nq, len(sets[sid])))
                cand[sid] = st
                buckets.add(sid, *st.bucket_key(ub_mode))
                stats.candidates += 1
            old_key = st.bucket_key(ub_mode)
            # Edge accounting for the sound bound: the first `cap` seen
            # incident edges are C's heaviest (descending stream).
            if st.n_edges < st.cap:
                st.w_head += s
            st.n_edges += 1
            # Greedy partial matching: the stream is descending, so
            # accepting every edge with two free endpoints IS greedy.
            if qi not in st.matched_q and tok not in st.matched_t:
                st.matched_q.add(qi)
                st.matched_t.add(tok)
                st.greedy += s
                llb.update(sid, st.greedy)  # LB-filter (Lemma 5)
            new_key = st.bucket_key(ub_mode)
            if new_key != old_key:
                buckets.move(sid, old_key[0], old_key[1], new_key[0], new_key[1])
        for sid in buckets.prune(llb.theta_lb, s):
            pruned.add(sid)
            stats.iub_filtered += 1
        if time_budget is not None and tup_no % 256 == 0:
            if time.perf_counter() - t_start > time_budget:
                stats.timed_out = True
                break

    stats.refine_seconds = time.perf_counter() - t_start
    survivors = {sid: st for sid, st in cand.items() if sid not in pruned}
    stats.peak_bytes = _approx_bytes(sims, inverted, cand, buckets, len(stream))

    # ---------------- post-processing (Algorithm 2) ----------------
    t_post = time.perf_counter()
    # Bounds at the end of refinement: LB = full greedy score over all
    # alpha-edges (Lemma 3); UB per ub_mode with the final stream sim.
    lb = {sid: st.greedy for sid, st in survivors.items()}
    ub = {sid: st.upper_bound(ub_mode, last_s) for sid, st in survivors.items()}
    so_known: dict[int, float] = {}
    checked: set[int] = set()
    alive = set(survivors)

    def w_of(sid: int) -> np.ndarray:
        return w_alpha[:, sets[sid]]

    if not post_filters:
        # Baseline+ post-processing: exact matching of every survivor.
        for sid in sorted(alive):
            if time_budget is not None and time.perf_counter() - t_start > time_budget:
                stats.timed_out = True
                break
            r = max_weight_matching(w_of(sid))
            assert r.score is not None
            stats.em_full += 1
            so_known[sid] = r.score
            lb[sid] = ub[sid] = r.score
            checked.add(sid)

    while post_filters:
        if time_budget is not None and time.perf_counter() - t_start > time_budget:
            stats.timed_out = True
            break
        top = sorted(alive, key=lambda x: (-ub[x], x))[:k]
        theta_ub = ub[top[-1]] if len(top) >= k else float("-inf")
        unchecked = [sid for sid in top if sid not in checked]
        if not unchecked:
            break
        sid = unchecked[0]  # highest UB first (paper: prioritizes high UB)
        if lb[sid] >= theta_ub:
            # No-EM filter (Lemma 7): guaranteed in a top-k result.
            checked.add(sid)
            stats.no_em += 1
            continue
        res = max_weight_matching(w_of(sid), abort_below=llb.theta_lb)
        if res.aborted:
            # EM-Early-Terminated filter (Lemma 8).
            alive.discard(sid)
            stats.em_early_terminated += 1
            continue
        assert res.score is not None
        stats.em_full += 1
        so_known[sid] = res.score
        lb[sid] = ub[sid] = res.score
        checked.add(sid)
        llb.update(sid, res.score)

    result_ids = sorted(alive, key=lambda x: (-ub[x], x))[:k]
    # Survivors never touched by the loop skipped their matching thanks to
    # the bound ordering — accounted under No-EM (see module docstring).
    stats.no_em += sum(1 for sid in alive if sid not in checked)

    topk: list[tuple[int, float]] = []
    exact: list[bool] = []
    for sid in result_ids:
        if sid in so_known:
            topk.append((sid, so_known[sid]))
            exact.append(True)
        elif finalize_scores:
            r = max_weight_matching(w_of(sid))
            assert r.score is not None
            topk.append((sid, r.score))
            exact.append(True)
        else:
            topk.append((sid, lb[sid]))
            exact.append(False)
    order = np.argsort([-s for _, s in topk], kind="stable")
    topk = [topk[i] for i in order]
    exact = [exact[i] for i in order]

    stats.post_seconds = time.perf_counter() - t_post
    return SearchResult(topk=topk, exact=exact, stats=stats, theta_lb=llb.theta_lb)


def _approx_bytes(
    sims: np.ndarray,
    inverted: dict[int, np.ndarray],
    cand: dict[int, _Cand],
    buckets: UBBuckets,
    stream_len: int,
) -> int:
    """Deterministic memory-footprint estimate of the live data structures
    (token stream, inverted index, candidate states, buckets) for the
    Table III metric — see DESIGN.md §5."""
    inv = sum(64 + 8 * len(v) for v in inverted.values())
    cands = sum(
        160 + 64 * (len(c.matched_q) + len(c.matched_t)) for c in cand.values()
    )
    return int(sims.nbytes + inv + cands + buckets.approx_bytes() + 24 * stream_len)


def brute_force_topk(
    query_ids: np.ndarray,
    sets: list[np.ndarray],
    sims: np.ndarray,
    *,
    k: int,
    alpha: float,
) -> list[tuple[int, float]]:
    """Reference oracle: exact SO of *every* set via the Hungarian
    algorithm, then top-k. Only for tests and tiny inputs."""
    w = sim_alpha(sims, alpha)
    scored = []
    for sid, toks in enumerate(sets):
        res = max_weight_matching(w[:, toks])
        assert res.score is not None
        if res.score > 0:
            scored.append((sid, res.score))
    scored.sort(key=lambda x: (-x[1], x[0]))
    return scored[:k]
