"""Table II — average percentage of sets pruned per filter.

Usage: spark-submit jobs/table2_pruning.py [n_uniform] [per_interval]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import get_spark  # noqa: E402

from repro import harness  # noqa: E402


def main() -> None:
    spark = get_spark()
    n_uniform = int(sys.argv[1]) if len(sys.argv) > 1 else 8
    per_interval = int(sys.argv[2]) if len(sys.argv) > 2 else 2
    df = harness.table2(
        spark, n_uniform=n_uniform, per_interval=per_interval
    )
    print(harness.format_table(df, "Table II: % of sets pruned by filters"))
    spark.stop()


if __name__ == "__main__":
    main()
