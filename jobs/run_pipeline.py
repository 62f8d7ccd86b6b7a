"""Run the full PPA-assembler workflow on one lite dataset and print
assembly statistics.

Usage: spark-submit jobs/run_pipeline.py [dataset] [scale] [k] [lr|sv]
"""
import sys

from jobs._session import get_spark
from repro.core.metrics import evaluate
from repro.core.pipeline import assemble
from repro.genome.simulate import make_dataset


def main() -> None:
    dataset = sys.argv[1] if len(sys.argv) > 1 else "hc2"
    scale = float(sys.argv[2]) if len(sys.argv) > 2 else 1.0
    k = int(sys.argv[3]) if len(sys.argv) > 3 else 31
    alg = sys.argv[4] if len(sys.argv) > 4 else "lr"
    spark = get_spark("pipeline")
    try:
        genome, reads = make_dataset(spark, dataset, scale=scale)
        res = assemble(spark, reads, k=k, algorithm=alg)
        seqs = [r.seq for r in res.contigs.select("seq").collect()]
        rep = evaluate(seqs, genome, min_len=500)
        print("counts:", res.counts)
        print("labeling k-mers:", res.stats_label_kmers)
        print("labeling contigs:", res.stats_label_contigs)
        print("quality:", rep)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
