"""Tests for the token stream I_e (heap merge of per-query iterators)."""
import numpy as np
import pytest

from repro.semsim.stream import TokenStream, stream_pairs
from repro.semsim.token_index import ExactTokenIndex

from tests.helpers import random_instance


@pytest.mark.parametrize("seed", range(6))
def test_stream_globally_descending(seed):
    _, _, q, sims = random_instance(seed)
    tuples = stream_pairs(sims, q, alpha=0.6)
    vals = [s for _, _, s in tuples]
    assert vals == sorted(vals, reverse=True)


@pytest.mark.parametrize("seed", range(6))
def test_stream_equals_flatten_sort(seed):
    """The lazy heap-merged stream must emit exactly the (q, t) pairs
    with sim >= alpha, i.e. the flattened sorted similarity matrix."""
    _, _, q, sims = random_instance(seed)
    alpha = 0.7
    tuples = stream_pairs(sims, q, alpha=alpha)
    got = {(qi, t) for qi, t, _ in tuples}
    qi, tj = np.nonzero(sims >= alpha)
    assert got == set(zip(qi.tolist(), tj.tolist()))
    for qi_, t, s in tuples:
        assert s == sims[qi_, t]


def test_stream_exact_matches_first_among_ties():
    """Among sim-1.0 entries, each query element's own token comes
    before other tokens tied at 1.0 for that element."""
    _, _, q, sims = random_instance(3)
    tuples = stream_pairs(sims, q, alpha=0.9)
    seen_self = set()
    for qi, t, s in tuples:
        if s == 1.0:
            if t == q[qi]:
                seen_self.add(qi)
    # Every query element emitted its own token at sim 1.
    assert seen_self == set(range(len(q)))
    # And it was that element's first sim-1.0 emission.
    first_one = {}
    for qi, t, s in tuples:
        if s == 1.0 and qi not in first_one:
            first_one[qi] = t
    for qi, t in first_one.items():
        assert t == q[qi]


def test_stream_respects_alpha_cut():
    _, _, q, sims = random_instance(4)
    for alpha in [0.5, 0.8, 0.95]:
        tuples = stream_pairs(sims, q, alpha=alpha)
        assert all(s >= alpha for _, _, s in tuples)


def test_stream_iterator_protocol():
    _, _, q, sims = random_instance(5)
    stream = TokenStream(ExactTokenIndex(sims, q, alpha=0.8), q)
    first = list(stream)
    assert first  # query tokens alone guarantee a non-empty stream
    assert list(stream) == []  # drained
