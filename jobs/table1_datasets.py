"""Table I — dataset characteristics (paper §VIII-A1).

Usage: spark-submit jobs/table1_datasets.py [dataset ...]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import get_spark  # noqa: E402

from repro import harness  # noqa: E402


def main() -> None:
    spark = get_spark()
    datasets = sys.argv[1:] or None
    df = harness.table1(spark, datasets)
    print(harness.format_table(df, "Table I: dataset characteristics"))
    spark.stop()


if __name__ == "__main__":
    main()
