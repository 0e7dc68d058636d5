"""Table III — average response time and memory, Koios vs. baseline.

Usage: spark-submit jobs/table3_response.py [n_uniform] [per_interval]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import get_spark  # noqa: E402

from repro import harness  # noqa: E402


def main() -> None:
    spark = get_spark()
    n_uniform = int(sys.argv[1]) if len(sys.argv) > 1 else 6
    per_interval = int(sys.argv[2]) if len(sys.argv) > 2 else 2
    df = harness.table3(spark, n_uniform=n_uniform, per_interval=per_interval)
    print(harness.format_table(df, "Table III: response time and memory"))
    spark.stop()


if __name__ == "__main__":
    main()
