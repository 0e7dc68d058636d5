"""The token stream ``I_e`` (paper §IV).

``I_e`` merges the per-query-element descending similarity iterators of the
token index into one global stream of tuples ``(q_row, token_id, sim)`` in
non-increasing similarity order, realized — exactly as in the paper — by a
priority queue ``P`` of size |Q| holding the next unseen candidate of every
query element. Popping the head refills only that element's slot via one
index probe. The stream ends when every remaining candidate falls below
``alpha``.

Tie-breaking: among equal similarities, exact matches (token == query
element) are emitted first, which is the paper's rule for initializing
bounds with the vanilla overlap (§V).
"""
from __future__ import annotations

import heapq
from collections.abc import Iterator

import numpy as np

from repro.semsim.token_index import ExactTokenIndex


class TokenStream:
    """Heap-merged global descending-similarity stream over all query rows."""

    def __init__(self, index: ExactTokenIndex, query_ids: np.ndarray):
        self._index = index
        self._query_ids = np.asarray(query_ids, dtype=np.int64)
        self._heap: list[tuple[float, int, int, int]] = []
        for qi in range(len(self._query_ids)):
            self._push(qi)

    def _push(self, qi: int) -> None:
        nxt = self._index.probe(qi)
        if nxt is None:
            return
        tok, sim = nxt
        # Max-heap via negated sim; exact matches first among ties.
        exact = 0 if tok == self._query_ids[qi] else 1
        heapq.heappush(self._heap, (-sim, exact, qi, tok))

    def __iter__(self) -> Iterator[tuple[int, int, float]]:
        return self

    def __next__(self) -> tuple[int, int, float]:
        if not self._heap:
            raise StopIteration
        neg_sim, _, qi, tok = heapq.heappop(self._heap)
        self._push(qi)
        return qi, tok, -neg_sim


def stream_pairs(
    sims: np.ndarray, query_ids: np.ndarray, alpha: float
) -> list[tuple[int, int, float]]:
    """Materialize the full token stream for ``sims``/``alpha``.

    Convenience for tests and for the vectorized refinement loop: the lazy
    heap-merged :class:`TokenStream` produces exactly this sequence.
    """
    return list(TokenStream(ExactTokenIndex(sims, query_ids, alpha), query_ids))
