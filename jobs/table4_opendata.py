"""Table IV — OpenData: #sets pruned by filters per cardinality interval.

Usage: spark-submit jobs/table4_opendata.py [per_interval]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import get_spark  # noqa: E402

from repro import harness  # noqa: E402


def main() -> None:
    spark = get_spark()
    per_interval = int(sys.argv[1]) if len(sys.argv) > 1 else 4
    df = harness.table4(spark, per_interval=per_interval)
    print(harness.format_table(df, "Table IV: OpenData pruning by interval"))
    spark.stop()


if __name__ == "__main__":
    main()
