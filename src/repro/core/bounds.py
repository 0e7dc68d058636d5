"""Bucketized incremental upper bounds — the iUB-Filter substrate (§V).

Candidate sets are grouped into buckets by their remaining matching
capacity ``m = min(|Q| - l, |C| - l)`` (l = size of the partial greedy
matching). For the last streamed similarity ``s``, every set in bucket m
has ``iUB = S + m * s`` (Lemma 6). Within a bucket, pairs are kept sorted
ascending by the partial score ``S``, so on a new stream similarity the
prunable prefix ``S < theta_lb - m * s`` is found by a prefix scan that
stops at the first survivor — only sets that actually contain a newly
streamed token are ever moved between buckets.
"""
from __future__ import annotations

from bisect import bisect_left, insort


class UBBuckets:
    """m -> ascending list of (S, sid); supports move, prune-prefix."""

    def __init__(self) -> None:
        self._buckets: dict[int, list[tuple[float, int]]] = {}

    def add(self, sid: int, s_score: float, m: int) -> None:
        insort(self._buckets.setdefault(m, []), (s_score, sid))

    def move(self, sid: int, old_score: float, old_m: int, new_score: float, new_m: int) -> None:
        """Relocate a set after its partial matching grew."""
        bucket = self._buckets[old_m]
        del bucket[bisect_left(bucket, (old_score, sid))]
        if not bucket:
            del self._buckets[old_m]
        self.add(sid, new_score, new_m)

    def prune(self, theta_lb: float, s: float) -> list[int]:
        """Remove and return all sets with ``S + m*s < theta_lb`` (strict,
        per Algorithm 1 line 9 — pruning at equality could discard valid
        tied top-k members)."""
        pruned: list[int] = []
        empty: list[int] = []
        for m, bucket in self._buckets.items():
            cut = theta_lb - m * s
            i = 0
            while i < len(bucket) and bucket[i][0] < cut:
                pruned.append(bucket[i][1])
                i += 1
            if i:
                del bucket[:i]
                if not bucket:
                    empty.append(m)
        for m in empty:
            del self._buckets[m]
        return pruned

    def upper_bound(self, s_score: float, m: int, s: float) -> float:
        """iUB of a single set (Lemma 6)."""
        return s_score + m * s

    def __len__(self) -> int:
        return sum(len(b) for b in self._buckets.values())

    def approx_bytes(self) -> int:
        """Rough memory accounting for the Table III footprint metric."""
        return sum(64 + 32 * len(b) for b in self._buckets.values())
