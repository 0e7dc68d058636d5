"""Running top-k lower-bound list ``L_lb`` (paper §III–IV).

Maintains the k largest lower bounds seen so far under increase-only
updates; ``theta_lb`` (its minimum, Lemma 4) never decreases and is always
a valid pruning threshold: ``theta_lb <= theta_k <= theta_k*``.

k is small (10 in the paper), so O(k) per update is cheaper and simpler
than a lazy heap.
"""
from __future__ import annotations


class TopKLowerBounds:
    """The k largest (lower-bound, set-id) pairs with increase-only updates."""

    def __init__(self, k: int, seed_threshold: float = 0.0):
        if k < 1:
            raise ValueError("k must be >= 1")
        self.k = k
        self._seed = seed_threshold
        self._best: dict[int, float] = {}  # sid -> lb, at most k entries

    @property
    def theta_lb(self) -> float:
        """Current pruning threshold (Lemma 4). The seed (e.g. a global
        theta_lb shared across partitions) floors it; until k distinct
        sets have bounds, only the seed applies."""
        if len(self._best) < self.k:
            return self._seed
        return max(self._seed, min(self._best.values()))

    def update(self, sid: int, lb: float) -> None:
        """Raise set ``sid``'s lower bound to ``lb`` (no-op if not larger)."""
        cur = self._best.get(sid)
        if cur is not None:
            if lb > cur:
                self._best[sid] = lb
            return
        if len(self._best) < self.k:
            self._best[sid] = lb
            return
        worst_sid = min(self._best, key=self._best.__getitem__)
        if lb > self._best[worst_sid]:
            del self._best[worst_sid]
            self._best[sid] = lb

    def __len__(self) -> int:
        return len(self._best)
