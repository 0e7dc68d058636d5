"""§VIII-E / Fig. 8 shape check — semantic vs. vanilla top-k quality.

Usage: spark-submit jobs/quality_compare.py [n_queries] [dataset]
"""
import sys

sys.path.insert(0, ".")

from repro import harness  # noqa: E402
from repro.datasets import benchmarks as B  # noqa: E402
from repro.datasets import generator as G  # noqa: E402


def main() -> None:
    n_queries = int(sys.argv[1]) if len(sys.argv) > 1 else 10
    dataset = sys.argv[2] if len(sys.argv) > 2 else "opendata"
    coll = G.load(dataset)
    queries = B.uniform_queries(coll, n=n_queries, seed=13)
    df = harness.quality_compare(coll, queries)
    print(harness.format_table(df, f"Semantic vs vanilla top-k ({dataset})"))
    print(
        "avg intersection:",
        round(df["intersection"].mean(), 2),
        "of k =", int(df["k"].iloc[0]),
    )


if __name__ == "__main__":
    main()
