"""Reproduce Table I: dataset inventory (lite substitutes).

Usage: spark-submit jobs/table1_datasets.py [scale]
"""
import sys

from jobs._session import get_spark
from repro.experiments.tables import format_table, table1


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table1")
    try:
        print(format_table(table1(spark, scale=scale), "Table I — datasets (lite)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
