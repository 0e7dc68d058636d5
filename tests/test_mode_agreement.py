"""Paper-mode Koios must agree with the provably-sound mode on the
benchmark datasets.

Lemma 6 is unsound in the adversarial case (test_lemma6_counterexample),
but the Tables II/IV/V harnesses run ``ub_mode="paper"`` to reproduce the
paper's filter behavior. This test samples benchmark queries per dataset
and checks the paper-mode result scores equal the sound-mode (exact)
ones, i.e. the unsoundness does not bite on these workloads.
"""
import pytest

from repro.core.koios import koios_search
from repro.datasets import benchmarks as B
from repro.datasets import generator as G

from tests.helpers import assert_same_topk


@pytest.mark.parametrize("name", ["dblp", "opendata", "twitter", "wdc"])
def test_modes_agree_on_dataset(name):
    coll = G.load(name)
    queries = B.uniform_queries(coll, n=2, seed=99)
    for q in queries:
        sims = coll.vocab.sim_matrix(q)
        sound = koios_search(q, coll.sets, sims, k=10, alpha=0.8, ub_mode="sound")
        paper = koios_search(q, coll.sets, sims, k=10, alpha=0.8, ub_mode="paper")
        assert_same_topk(paper.topk, sound.topk)
