"""Exact top-similarity token index — the Faiss substitute.

The paper streams vocabulary tokens per query element in descending
similarity order from a GPU Faiss index. Faiss is used as an *exact* top-k
index there ("KOIOS returns an exact solution as long as the index returns
exact results"), so the faithful offline substitute is an exact brute-force
index over the vocabulary similarity matrix.

The contract mirrors the paper's ``I``: ``probe(qi)`` returns the next most
similar *unseen* vocabulary token for query element ``qi``, or ``None``
once the next one falls below the ``alpha`` threshold. Per §V, the query
element itself is always returned by the first probe (similarity 1), which
is what initializes candidate bounds with the vanilla overlap and handles
out-of-vocabulary elements.
"""
from __future__ import annotations

import numpy as np


class ExactTokenIndex:
    """Per-query-element descending similarity iterators over a vocabulary.

    Args:
        sims: exact (|Q|, |D|) similarity matrix of the query tokens
            against the vocabulary (from a ``semsim.simfn`` similarity).
        query_ids: vocabulary ids of the query tokens (used to force the
            query-element-first rule even under similarity ties).
        alpha: minimum similarity; probes below it return ``None``.
    """

    def __init__(self, sims: np.ndarray, query_ids: np.ndarray, alpha: float):
        self.alpha = alpha
        self._sims = sims
        q = np.asarray(query_ids, dtype=np.int64)
        # Stable descending order per row, with the query token itself
        # forced to the front (it has sim exactly 1, but ties with other
        # sim-1 tokens must not hide it: the first probe for q must be q).
        order = np.argsort(-sims, axis=1, kind="stable")
        for i, qid in enumerate(q):
            row = order[i]
            pos = int(np.nonzero(row == qid)[0][0])
            if pos != 0:
                order[i, 1 : pos + 1] = row[:pos]
                order[i, 0] = qid
        self._order = order
        self._cursor = np.zeros(len(q), dtype=np.int64)

    def probe(self, qi: int) -> tuple[int, float] | None:
        """Next most similar unseen vocabulary token for query row ``qi``
        as ``(token_id, sim)``, or ``None`` when exhausted below alpha.
        """
        c = self._cursor[qi]
        if c >= self._order.shape[1]:
            return None
        tok = int(self._order[qi, c])
        sim = float(self._sims[qi, tok])
        if sim < self.alpha:
            return None
        self._cursor[qi] = c + 1
        return tok, sim
