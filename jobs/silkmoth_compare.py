"""§VIII-B text comparison — Koios vs. SilkMoth-semantic on Jaccard
3-gram similarity (both systems, same sim function, as in the paper).

Usage: spark-submit jobs/silkmoth_compare.py [n_queries] [dataset]
"""
import sys
import time

sys.path.insert(0, ".")

import numpy as np  # noqa: E402
import pandas as pd  # noqa: E402

from repro import harness  # noqa: E402
from repro.core.koios import koios_search  # noqa: E402
from repro.datasets import benchmarks as B  # noqa: E402
from repro.datasets import generator as G  # noqa: E402
from repro.fuzzy.silkmoth import silkmoth_topk  # noqa: E402
from repro.semsim.inverted import build_inverted  # noqa: E402
from repro.semsim.simfn import QGramJaccardSim  # noqa: E402


def main() -> None:
    n_queries = int(sys.argv[1]) if len(sys.argv) > 1 else 10
    dataset = sys.argv[2] if len(sys.argv) > 2 else "opendata"
    coll = G.load(dataset)
    simfn = QGramJaccardSim(coll.vocab)
    inverted = build_inverted(coll.sets)
    queries = B.uniform_queries(coll, n=n_queries, seed=11)
    k, alpha = 10, 0.8
    rows = []
    for q in queries:
        sims = simfn.matrix(q)
        t0 = time.perf_counter()
        kres = koios_search(q, coll.sets, sims, k=k, alpha=alpha, inverted=inverted)
        t_koios = time.perf_counter() - t0
        theta_kstar = kres.topk[-1][1] if kres.topk else 0.0
        t0 = time.perf_counter()
        sres, sstats = silkmoth_topk(
            q, coll.sets, sims, k=k, theta_kstar=theta_kstar, alpha=alpha,
            inverted=inverted,
        )
        t_silk = time.perf_counter() - t0
        rows.append(
            {
                "query_card": len(q),
                "koios_s": round(t_koios, 3),
                "silkmoth_s": round(t_silk, 3),
                "silkmoth_verified": sstats.verified,
                "same_scores": bool(
                    np.allclose(
                        sorted(s for _, s in kres.topk),
                        sorted(s for _, s in sres),
                        atol=1e-8,
                    )
                ),
            }
        )
    df = pd.DataFrame(rows)
    print(harness.format_table(df, f"SilkMoth comparison ({dataset})"))
    print(
        f"avg koios={df['koios_s'].mean():.3f}s "
        f"avg silkmoth-semantic={df['silkmoth_s'].mean():.3f}s "
        f"(paper: 72s vs 400s on OpenData)"
    )


if __name__ == "__main__":
    main()
