"""Reproduce Table II (and III as a byproduct): LR vs S-V labeling.

Usage: spark-submit jobs/table2_labeling_kmers.py [scale] [dataset ...]
"""
import sys

from jobs._session import get_spark
from repro.experiments.tables import ALL_DATASETS, format_table, table2_and_3


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    datasets = sys.argv[2:] or ALL_DATASETS
    spark = get_spark("table2")
    try:
        t2, _ = table2_and_3(spark, datasets=datasets, scale=scale)
        print(format_table(t2, "Table II — LR vs S-V, labeling unambiguous k-mers"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
