"""Experiment harness — one entry point per evaluation table.

Each ``table*`` function reproduces the corresponding table of the paper
(§VIII) on the synthetic datasets and returns a pandas DataFrame whose
rows mirror the paper's rows; the paper's own numbers are kept alongside
in ``PAPER_*`` constants so EXPERIMENTS.md can diff shapes. Jobs under
``jobs/`` and benchmarks under ``benchmarks/`` are thin wrappers.

Defaults follow §VIII-A3: alpha = 0.8, k = 10, partitions = 10.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.koios import UBMode
from repro.core.spark_search import (
    DistributedResult,
    koios_spark,
    partitioned_sets_df,
)
from repro.core.vanilla import vanilla_topk
from repro.datasets import benchmarks as B
from repro.datasets import generator as G

DATASETS = ["dblp", "opendata", "twitter", "wdc"]
DEFAULT_K = 10
DEFAULT_ALPHA = 0.8
DEFAULT_PARTITIONS = 10

# ---------- paper-reported numbers (for EXPERIMENTS.md diffing) ----------
PAPER_TABLE1 = pd.DataFrame(
    {
        "dataset": DATASETS,
        "paper_n_sets": [4246, 15636, 27204, 1014369],
        "paper_max_size": [514, 31901, 151, 10240],
        "paper_avg_size": [178.7, 86.4, 22.6, 30.6],
        "paper_n_uniq": [25159, 179830, 72910, 328357],
    }
)
PAPER_TABLE2 = pd.DataFrame(
    {
        "dataset": DATASETS,
        "paper_iub_pct": [91.0, 85.5, 53.5, 89.2],
        "paper_emet_pct": [5.0, 2.1, 0.0, 0.9],
        "paper_noem_pct": [9.2, 54.8, 1.4, 9.8],
    }
)
PAPER_TABLE3 = pd.DataFrame(
    {
        "dataset": DATASETS,
        "paper_koios_refine_s": [0.3, 7.19, 0.2, 109.0],
        "paper_koios_post_s": [0.44, 6.9, 0.45, 34.3],
        "paper_koios_response_s": [0.83, 18.6, 0.7, 147.0],
        "paper_koios_mem_mb": [16.0, 69.6, 10.0, 1775.0],
        "paper_baseline_response_s": [211.0, 101.0, 518.0, 1062.0],
        "paper_baseline_mem_mb": [11.0, 102.5, 10.0, 885.0],
    }
)
PAPER_TABLE4 = pd.DataFrame(
    {
        "interval": ["10-750", "750-1000", "1000-1500", "1500-2500", "2500-5000", ">5000"],
        "paper_candidates": [1132, 2557, 2699, 3440, 3560, 5706],
        "paper_iub": [345, 2422, 2571, 3328, 3451, 5502],
        "paper_noem": [88, 85, 83, 84, 82, 79],
        "paper_emet": [0, 2, 4, 2, 4, 5],
        "paper_em": [699, 48, 41, 26, 23, 120],
    }
)
PAPER_TABLE5 = pd.DataFrame(
    {
        "interval": ["20-250", "250-500", "500-750", "750-1000", ">1000"],
        "paper_candidates": [124217, 189665, 262947, 274695, 402622],
        "paper_iub": [60196, 186512, 261901, 273743, 402332],
        "paper_noem": [74, 90, 85, 83, 84],
        "paper_emet": [80, 3, 6, 26, 3],
        "paper_em": [63867, 3060, 953, 843, 203],
    }
)


# ------------------------------- Table I -------------------------------
def table1(spark: SparkSession, datasets: list[str] | None = None) -> pd.DataFrame:
    """Dataset characteristics computed with Spark aggregations."""
    rows = []
    for name in datasets or DATASETS:
        coll = G.load(name)
        df = coll.to_spark(spark)
        agg = (
            df.select(
                F.count("*").alias("n_sets"),
                F.max(F.size("tokens")).alias("max_size"),
                F.avg(F.size("tokens")).alias("avg_size"),
            ).collect()[0]
        )
        n_uniq = (
            df.select(F.explode("tokens").alias("t")).distinct().count()
        )
        rows.append(
            {
                "dataset": name,
                "n_sets": agg["n_sets"],
                "max_size": agg["max_size"],
                "avg_size": round(agg["avg_size"], 1),
                "n_uniq": n_uniq,
            }
        )
    return pd.DataFrame(rows).merge(PAPER_TABLE1, on="dataset", how="left")


# --------------------------- query execution ---------------------------
@dataclass
class QueryRun:
    """One query's outcome through the distributed search."""

    query_card: int
    response_seconds: float
    result: DistributedResult


def bench_queries(
    coll: G.Collection, *, n_uniform: int = 8, per_interval: int = 4, seed: int = 7
) -> dict[str, list[np.ndarray]]:
    """The query benchmark of §VIII-A2: interval-sampled for
    OpenData/WDC, uniform for DBLP/Twitter. Keys are interval labels."""
    if coll.name in B.INTERVALS:
        qs = B.interval_queries(coll, per_interval=per_interval, seed=seed)
        return {f"{lo}-{hi - 1}": lst for (lo, hi), lst in qs.items()}
    return {"all": uniform} if (uniform := B.uniform_queries(coll, n=n_uniform, seed=seed)) else {}


def run_queries(
    spark: SparkSession,
    coll: G.Collection,
    queries: list[np.ndarray],
    *,
    k: int = DEFAULT_K,
    alpha: float = DEFAULT_ALPHA,
    n_partitions: int = DEFAULT_PARTITIONS,
    ub_mode: UBMode = "sound",
    algo: str = "koios",
    time_budget: float | None = 60.0,
    sets_df=None,
) -> list[QueryRun]:
    """Run each query through the distributed search, timing wall-clock."""
    if sets_df is None:
        sets_df = partitioned_sets_df(spark, coll.sets, n_partitions=n_partitions)
        sets_df.count()  # materialize the cache before timing
    runs = []
    for q in queries:
        sims = coll.vocab.sim_matrix(q)
        t0 = time.perf_counter()
        res = koios_spark(
            spark, q, coll.sets, sims, k=k, alpha=alpha,
            n_partitions=n_partitions, ub_mode=ub_mode, algo=algo,
            time_budget=time_budget, sets_df=sets_df,
        )
        runs.append(
            QueryRun(
                query_card=len(q),
                response_seconds=time.perf_counter() - t0,
                result=res,
            )
        )
    return runs


# ------------------------------- Table II -------------------------------
def table2(
    spark: SparkSession,
    *,
    datasets: list[str] | None = None,
    n_uniform: int = 8,
    per_interval: int = 2,
    k: int = DEFAULT_K,
    alpha: float = DEFAULT_ALPHA,
    n_partitions: int = DEFAULT_PARTITIONS,
    ub_mode: UBMode = "sound",
) -> pd.DataFrame:
    """Average percentage of sets pruned per filter (paper Table II).

    iUB%% is relative to all candidates; EM-ET%% and No-EM%% are relative
    to the sets that reach post-processing (as in the paper).
    """
    rows = []
    for name in datasets or DATASETS:
        coll = G.load(name)
        sets_df = partitioned_sets_df(spark, coll.sets, n_partitions=n_partitions)
        sets_df.count()
        per_q = []
        for label, qs in bench_queries(
            coll, n_uniform=n_uniform, per_interval=per_interval
        ).items():
            for run in run_queries(
                spark, coll, qs, k=k, alpha=alpha, n_partitions=n_partitions,
                ub_mode=ub_mode, sets_df=sets_df,
            ):
                s = run.result.total_stats()
                post = max(s.survivors, 1)
                per_q.append(
                    (
                        100.0 * s.iub_filtered / max(s.candidates, 1),
                        100.0 * s.em_early_terminated / post,
                        100.0 * s.no_em / post,
                    )
                )
        arr = np.array(per_q)
        rows.append(
            {
                "dataset": name,
                "iub_pct": round(float(arr[:, 0].mean()), 1),
                "emet_pct": round(float(arr[:, 1].mean()), 1),
                "noem_pct": round(float(arr[:, 2].mean()), 1),
                "n_queries": len(per_q),
            }
        )
        sets_df.unpersist()
    return pd.DataFrame(rows).merge(PAPER_TABLE2, on="dataset", how="left")


# ------------------------------- Table III ------------------------------
def table3(
    spark: SparkSession,
    *,
    datasets: list[str] | None = None,
    n_uniform: int = 6,
    per_interval: int = 2,
    k: int = DEFAULT_K,
    alpha: float = DEFAULT_ALPHA,
    n_partitions: int = DEFAULT_PARTITIONS,
    ub_mode: UBMode = "sound",
    time_budget: float = 60.0,
) -> pd.DataFrame:
    """Average response time and memory, Koios vs. the baseline.

    As in the paper, the baseline for WDC is Baseline+ (plain baseline
    is infeasible there); timed-out queries are excluded from timing
    averages but counted.
    """
    rows = []
    for name in datasets or DATASETS:
        coll = G.load(name)
        sets_df = partitioned_sets_df(spark, coll.sets, n_partitions=n_partitions)
        sets_df.count()
        queries = [
            q
            for qs in bench_queries(
                coll, n_uniform=n_uniform, per_interval=per_interval
            ).values()
            for q in qs
        ]
        baseline_algo = "baseline_plus" if name == "wdc" else "baseline"
        rec: dict[str, float | str | int] = {"dataset": name, "baseline_algo": baseline_algo}
        for algo in ["koios", baseline_algo]:
            runs = run_queries(
                spark, coll, queries, k=k, alpha=alpha,
                n_partitions=n_partitions, ub_mode=ub_mode, algo=algo,
                time_budget=time_budget, sets_df=sets_df,
            )
            ok = [r for r in runs if not r.result.total_stats().timed_out]
            key = "koios" if algo == "koios" else "baseline"
            stats = [r.result.total_stats() for r in ok]
            rec[f"{key}_refine_s"] = round(
                float(np.mean([s.refine_seconds for s in stats])), 3
            ) if ok else float("nan")
            rec[f"{key}_post_s"] = round(
                float(np.mean([s.post_seconds for s in stats])), 3
            ) if ok else float("nan")
            rec[f"{key}_response_s"] = round(
                float(np.mean([r.response_seconds for r in ok])), 3
            ) if ok else float("nan")
            rec[f"{key}_mem_mb"] = round(
                float(np.mean([s.peak_bytes for s in stats])) / 1e6, 1
            ) if ok else float("nan")
            rec[f"{key}_em"] = round(
                float(np.mean([s.em_full for s in stats])), 1
            ) if ok else float("nan")
            rec[f"{key}_timeouts"] = len(runs) - len(ok)
        rows.append(rec)
        sets_df.unpersist()
    return pd.DataFrame(rows).merge(PAPER_TABLE3, on="dataset", how="left")


# ---------------------------- Tables IV & V ----------------------------
def pruning_by_interval(
    spark: SparkSession,
    dataset: str,
    *,
    per_interval: int = 4,
    k: int = DEFAULT_K,
    alpha: float = DEFAULT_ALPHA,
    n_partitions: int = DEFAULT_PARTITIONS,
    ub_mode: UBMode = "sound",
) -> pd.DataFrame:
    """#sets pruned per filter, by query cardinality interval (Tables
    IV/V). Counts are averaged over the interval's queries and summed
    over partitions, as in the paper."""
    coll = G.load(dataset)
    sets_df = partitioned_sets_df(spark, coll.sets, n_partitions=n_partitions)
    sets_df.count()
    rows = []
    for label, qs in bench_queries(coll, per_interval=per_interval).items():
        runs = run_queries(
            spark, coll, qs, k=k, alpha=alpha, n_partitions=n_partitions,
            ub_mode=ub_mode, sets_df=sets_df,
        )
        stats = [r.result.total_stats() for r in runs]
        rows.append(
            {
                "interval": label,
                "candidates": int(np.mean([s.candidates for s in stats])),
                "iub": int(np.mean([s.iub_filtered for s in stats])),
                "noem": int(np.mean([s.no_em for s in stats])),
                "emet": int(np.mean([s.em_early_terminated for s in stats])),
                "em": int(np.mean([s.em_full for s in stats])),
                "n_queries": len(runs),
            }
        )
    sets_df.unpersist()
    out = pd.DataFrame(rows)
    paper = PAPER_TABLE4 if dataset == "opendata" else PAPER_TABLE5
    paper = paper.copy()
    paper["row"] = range(len(paper))
    out["row"] = range(len(out))
    return out.merge(paper, on="row", how="left", suffixes=("", "_paper")).drop(
        columns=["row"]
    )


def table4(spark: SparkSession, **kw) -> pd.DataFrame:
    return pruning_by_interval(spark, "opendata", **kw)


def table5(spark: SparkSession, **kw) -> pd.DataFrame:
    return pruning_by_interval(spark, "wdc", **kw)


# ---------------------- quality (Fig. 8 shape check) --------------------
def quality_compare(
    coll: G.Collection,
    queries: list[np.ndarray],
    *,
    k: int = DEFAULT_K,
    alpha: float = DEFAULT_ALPHA,
) -> pd.DataFrame:
    """Semantic vs. vanilla top-k (§VIII-E): k-th scores and result
    intersection size, per query (driver-side kernel; no Spark needed)."""
    from repro.core.koios import koios_search
    from repro.matching.hungarian import max_weight_matching
    from repro.semsim.simfn import sim_alpha

    rows = []
    for q in queries:
        sims = coll.vocab.sim_matrix(q)
        sem = koios_search(q, coll.sets, sims, k=k, alpha=alpha)
        van = vanilla_topk(q, coll.sets, k=k)
        sem_ids = {sid for sid, _ in sem.topk}
        van_ids = {sid for sid, _ in van}
        w = sim_alpha(sims, alpha)
        van_kth_semantic = min(
            (max_weight_matching(w[:, coll.sets[sid]]).score or 0.0)
            for sid in van_ids
        ) if van_ids else 0.0
        rows.append(
            {
                "query_card": len(q),
                "sem_kth_so": round(sem.topk[-1][1], 2) if sem.topk else 0.0,
                "van_kth_overlap": van[-1][1] if van else 0.0,
                "van_kth_so": round(van_kth_semantic, 2),
                "intersection": len(sem_ids & van_ids),
                "k": k,
            }
        )
    return pd.DataFrame(rows)


def format_table(df: pd.DataFrame, title: str) -> str:
    """Markdown rendering used by jobs and recorded in EXPERIMENTS.md
    (hand-rolled: tabulate is unavailable offline)."""
    cols = list(df.columns)
    cells = [[_fmt(v) for v in row] for row in df.itertuples(index=False)]
    widths = [
        max(len(c), *(len(r[i]) for r in cells)) if cells else len(c)
        for i, c in enumerate(cols)
    ]
    header = "| " + " | ".join(c.ljust(w) for c, w in zip(cols, widths)) + " |"
    sep = "|" + "|".join("-" * (w + 2) for w in widths) + "|"
    body = [
        "| " + " | ".join(v.ljust(w) for v, w in zip(row, widths)) + " |"
        for row in cells
    ]
    return "\n".join([f"### {title}", "", header, sep, *body]) + "\n"


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.3g}" if abs(v) < 1000 else f"{v:.0f}"
    return str(v)
