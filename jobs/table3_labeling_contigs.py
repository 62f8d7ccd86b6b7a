"""Reproduce Table III: LR vs S-V for labeling contigs (round 2).

Usage: spark-submit jobs/table3_labeling_contigs.py [scale] [dataset ...]
"""
import sys

from jobs._session import get_spark
from repro.experiments.tables import ALL_DATASETS, format_table, table2_and_3


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    datasets = sys.argv[2:] or ALL_DATASETS
    spark = get_spark("table3")
    try:
        _, t3 = table2_and_3(spark, datasets=datasets, scale=scale)
        print(format_table(t3, "Table III — LR vs S-V, labeling contigs"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
