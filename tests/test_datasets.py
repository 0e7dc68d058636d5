"""Tests for the synthetic dataset generators (Table I shapes)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.datasets import generator as G


@pytest.fixture(scope="module")
def dblp():
    return G.load("dblp")


@pytest.fixture(scope="module")
def wdc():
    return G.load("wdc")


def test_all_specs_load():
    for name in G.SPECS:
        assert G.load(name).n_sets > 0


def test_deterministic(dblp):
    again = G.load("dblp")
    assert all(
        np.array_equal(a, b) for a, b in zip(dblp.sets, again.sets)
    )
    assert dblp.vocab.tokens == again.vocab.tokens


@pytest.mark.parametrize("name", list(G.SPECS))
def test_sets_are_sets(name):
    coll = G.load(name)
    for s in coll.sets[:200]:
        assert len(np.unique(s)) == len(s)
        assert s.min() >= 0 and s.max() < len(coll.vocab)


@pytest.mark.parametrize("name", list(G.SPECS))
def test_characteristics_match_spec(name):
    coll = G.load(name)
    spec = G.SPECS[name]
    ch = coll.characteristics()
    assert ch["n_sets"] == spec.n_sets
    assert ch["max_size"] <= spec.size_max
    assert ch["avg_size"] >= spec.size_min


def test_relative_shape_of_table1():
    """The orderings the paper's Table I exhibits must survive scaling:
    WDC has the most sets; DBLP the largest average cardinality;
    OpenData the largest maximum cardinality."""
    ch = {n: G.load(n).characteristics() for n in G.SPECS}
    assert ch["wdc"]["n_sets"] == max(c["n_sets"] for c in ch.values())
    assert ch["dblp"]["avg_size"] == max(
        c["avg_size"] for c in ch.values()
    )
    assert ch["opendata"]["max_size"] == max(
        c["max_size"] for c in ch.values()
    )
    assert ch["twitter"]["avg_size"] == min(
        c["avg_size"] for c in ch.values()
    )


def test_wdc_has_skewed_posting_lists(wdc):
    """The paper: WDC has very frequent elements -> huge posting lists."""
    from repro.semsim.inverted import build_inverted

    inv = build_inverted(wdc.sets)
    lens = np.array(sorted((len(v) for v in inv.values()), reverse=True))
    assert lens[0] > 50 * np.median(lens)


def test_cardinality_skew_opendata():
    coll = G.load("opendata")
    sizes = np.array([len(s) for s in coll.sets])
    assert sizes.max() > 10 * np.median(sizes)


def test_to_spark_roundtrip(spark, dblp):
    df = dblp.to_spark(spark)
    assert df.count() == dblp.n_sets
    row = df.filter(F.col("set_id") == 3).collect()[0]
    assert row["tokens"] == [dblp.vocab.tokens[t] for t in dblp.sets[3]]


def test_spark_characteristics_match_driver(spark, dblp):
    df = dblp.to_spark(spark)
    agg = df.select(
        F.count("*").alias("n"),
        F.max(F.size("tokens")).alias("mx"),
        F.avg(F.size("tokens")).alias("avg"),
    ).collect()[0]
    ch = dblp.characteristics()
    assert agg["n"] == ch["n_sets"]
    assert agg["mx"] == ch["max_size"]
    assert np.isclose(agg["avg"], ch["avg_size"])
