"""Reproduce Table V: reference-free quality on HC-14 (lite).

Usage: spark-submit jobs/table5_quality_hc14.py [scale]
"""
import sys

from jobs._session import get_spark
from repro.experiments.tables import format_table, table5


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table5")
    try:
        print(format_table(table5(spark, scale=scale), "Table V — quality on HC-14 (lite)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
