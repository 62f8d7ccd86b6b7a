"""Reproduce Table IV: quality of all four assemblers on HC-2 (lite),
with reference-based QUAST-lite metrics.

Usage: spark-submit jobs/table4_quality_hc2.py [scale]
"""
import sys

from jobs._session import get_spark
from repro.experiments.tables import format_table, table4


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table4")
    try:
        print(format_table(table4(spark, scale=scale), "Table IV — quality on HC-2 (lite)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
