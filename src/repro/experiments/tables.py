"""Reproduction harnesses: one function per evaluation table.

Each function runs the corresponding experiment on the lite datasets
(DESIGN.md "Dataset substitutions") and returns plain-dict rows that
``format_table`` renders like the paper's tables. Paper-published
values live in ``repro.experiments.paper_numbers``.
"""
from __future__ import annotations

import time
from typing import Iterable

from pyspark.sql import SparkSession

from repro.baselines.abyss_like import abyss_assemble
from repro.baselines.ray_like import ray_assemble
from repro.baselines.swap_like import swap_assemble
from repro.core.labeling import label_contigs
from repro.core.metrics import QualityReport, evaluate
from repro.core.pipeline import assemble
from repro.genome.simulate import DATASETS, make_dataset
from repro.pregel.engine import shuffle_partitions

ALL_DATASETS = ("hc2", "hcx", "hc14", "bi")

#: default k for benchmarks (the paper's value)
K = 31
#: quality-table contig length cutoff (QUAST's ≥500 bp)
MIN_LEN = 500


def table1(spark: SparkSession, *, scale: float = 1.0) -> list[dict]:
    """Table I — dataset inventory of the lite substitutes."""
    rows = []
    for name in ALL_DATASETS:
        spec = DATASETS[name]
        genome, reads = make_dataset(spark, name, scale=scale)
        n = reads.count()
        rows.append(
            {
                "dataset": name,
                "paper_name": spec.paper_name,
                "n_reads": n,
                "avg_read_len": spec.read_len,
                "ref_len": len(genome),
                "depth_x": round(n * spec.read_len / len(genome), 1),
            }
        )
    return rows


def _label_both_ways(spark: SparkSession, items, partitions: int) -> dict:
    out = {}
    with shuffle_partitions(spark, partitions):
        for alg in ("lr", "sv"):
            res = label_contigs(spark, items, alg)
            out[alg] = (
                res.stats.supersteps,
                res.stats.messages,
                round(res.stats.runtime_s, 2),
            )
    return out


def table2_and_3(
    spark: SparkSession,
    *,
    datasets: Iterable[str] = ALL_DATASETS,
    scale: float = 1.0,
    k: int = K,
    theta: int = 1,
    partitions: int = 8,
) -> tuple[list[dict], list[dict]]:
    """Tables II & III — LR vs S-V labeling stats.

    For each dataset the workflow runs once (capturing the round-1
    k-mer item graph and the round-2 mixed contig graph), then each
    captured graph is labeled with both algorithms under identical
    conditions — exactly the paper's two labeling workloads.
    """
    t2, t3 = [], []
    for name in datasets:
        _, reads = make_dataset(spark, name, scale=scale)
        res = assemble(spark, reads, k=k, theta=theta, partitions=partitions)
        for table, items in ((t2, res.label_inputs["round1"]), (t3, res.label_inputs["round2"])):
            stats = _label_both_ways(spark, items, partitions)
            table.append(
                {
                    "dataset": name,
                    "supersteps_lr": stats["lr"][0],
                    "supersteps_sv": stats["sv"][0],
                    "messages_lr": stats["lr"][1],
                    "messages_sv": stats["sv"][1],
                    "runtime_lr_s": stats["lr"][2],
                    "runtime_sv_s": stats["sv"][2],
                }
            )
    return t2, t3


def _report_row(assembler: str, rep: QualityReport, with_ref: bool) -> dict:
    row = {
        "assembler": assembler,
        "n_contigs": rep.n_contigs,
        "total_length": rep.total_length,
        "n50": rep.n50,
        "largest_contig": rep.largest_contig,
    }
    if with_ref:
        row.update(
            {
                "gc_pct": round(rep.gc_pct, 2),
                "n_misassemblies": rep.n_misassemblies,
                "misassembled_length": rep.misassembled_length,
                "unaligned_length": rep.unaligned_length,
                "genome_fraction_pct": round(rep.genome_fraction_pct, 3),
                "mismatches_per_100kbp": round(rep.mismatches_per_100kbp, 2),
                "indels_per_100kbp": round(rep.indels_per_100kbp, 2),
                "largest_alignment": rep.largest_alignment,
            }
        )
    return row


def _run_all_assemblers(spark, reads, *, k: int, partitions: int) -> dict:
    runs = {}
    runs["PPA"] = assemble(spark, reads, k=k, theta=1, partitions=partitions)
    runs["ABySS"] = abyss_assemble(spark, reads, k=k, theta=1, partitions=partitions)
    runs["Ray"] = ray_assemble(spark, reads, k=k, partitions=partitions)
    runs["SWAP"] = swap_assemble(spark, reads, k=k, partitions=partitions)
    return runs


def _quality_table(
    spark, dataset: str, *, with_ref: bool, scale: float, k: int, min_len: int, partitions: int
) -> list[dict]:
    genome, reads = make_dataset(spark, dataset, scale=scale)
    rows = []
    for name, res in _run_all_assemblers(spark, reads, k=k, partitions=partitions).items():
        seqs = [r.seq for r in res.contigs.select("seq").collect()]
        rep = evaluate(seqs, genome if with_ref else None, min_len=min_len)
        rows.append(_report_row(name, rep, with_ref))
    return rows


def table4(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    k: int = K,
    min_len: int = MIN_LEN,
    partitions: int = 8,
) -> list[dict]:
    """Table IV — quality of all four assemblers on HC-2 (with ref)."""
    return _quality_table(
        spark, "hc2", with_ref=True, scale=scale, k=k, min_len=min_len, partitions=partitions
    )


def table5(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    k: int = K,
    min_len: int = MIN_LEN,
    partitions: int = 8,
) -> list[dict]:
    """Table V — reference-free quality on HC-14."""
    return _quality_table(
        spark, "hc14", with_ref=False, scale=scale, k=k, min_len=min_len, partitions=partitions
    )


def format_table(rows: list[dict], title: str = "") -> str:
    """Render rows as an aligned text table (also valid Markdown)."""
    if not rows:
        return f"{title}\n(no rows)"
    cols = list(rows[0])
    widths = {
        c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows)) for c in cols
    }
    header = "| " + " | ".join(str(c).ljust(widths[c]) for c in cols) + " |"
    sep = "|" + "|".join("-" * (widths[c] + 2) for c in cols) + "|"
    body = [
        "| " + " | ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols) + " |"
        for r in rows
    ]
    out = [header, sep, *body]
    if title:
        out.insert(0, f"### {title}")
    return "\n".join(out)
