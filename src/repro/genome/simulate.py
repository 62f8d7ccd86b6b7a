"""Synthetic genomes and an ART-like short-read simulator.

Substitutes for the paper's datasets (Table I): ART-simulated reads
from NCBI references (HC-2, HC-X) and real GAGE reads (HC-14, BI).
The simulator reproduces the properties the assembler code paths
depend on (see DESIGN.md):

* reads come from **both strands**, always 5'→3' (strand-2 reads are
  reverse complements of the forward segment) — exercises canonical
  k-mers and edge polarity;
* i.i.d. substitution errors — create DBG tips and bubbles;
* occasional 'N' bases — exercise read splitting in DBG construction;
* planted repeat families (some reverse-complemented) — create
  genuinely ambiguous ⟨m-n⟩ vertices, which is what terminates contigs
  in real genomes.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_NTS = np.frombuffer(b"ACGT", dtype=np.uint8)


def random_genome(
    length: int,
    *,
    seed: int = 0,
    gc: float = 0.41,
    n_repeat_families: int = 0,
    repeat_len: int = 200,
    repeat_copies: int = 3,
) -> str:
    """Random DNA string with optional planted repeats.

    ``gc`` sets the G+C fraction (human ≈ 0.41, Table IV). Each repeat
    family copies one ``repeat_len`` segment to ``repeat_copies - 1``
    random positions, half of them reverse-complemented — at k=31 these
    are the only sources of ambiguous DBG vertices in a random string.
    """
    g = np.random.default_rng(seed)
    p = np.array([(1 - gc) / 2, gc / 2, gc / 2, (1 - gc) / 2])
    codes = g.choice(4, size=length, p=p)  # indices into ACGT
    arr = _NTS[codes].copy()
    for _ in range(n_repeat_families):
        if length < 2 * repeat_len:
            break
        src = int(g.integers(0, length - repeat_len))
        seg = arr[src : src + repeat_len].copy()
        for _ in range(repeat_copies - 1):
            dst = int(g.integers(0, length - repeat_len))
            if g.random() < 0.5:
                comp = seg.copy()
                # A<->T, C<->G on ASCII codes via translate table
                comp = np.frombuffer(
                    bytes(comp).translate(bytes.maketrans(b"ACGT", b"TGCA"))[::-1],
                    dtype=np.uint8,
                )
                arr[dst : dst + repeat_len] = comp
            else:
                arr[dst : dst + repeat_len] = seg
    return bytes(arr).decode()


def simulate_reads(
    genome: str,
    *,
    n_reads: int,
    read_len: int,
    error_rate: float = 0.005,
    n_rate: float = 0.0005,
    seed: int = 0,
) -> pd.DataFrame:
    """ART-like Illumina read simulation → pandas ``(read_id, seq)``.

    Start positions are uniform, strand is fair-coin (strand-2 reads are
    reverse complements), substitutions are i.i.d. at ``error_rate`` and
    bases are replaced by 'N' at ``n_rate`` (measurement dropouts).
    """
    if len(genome) < read_len:
        raise ValueError("genome shorter than read length")
    g = np.random.default_rng(seed)
    garr = np.frombuffer(genome.encode(), dtype=np.uint8)
    starts = g.integers(0, len(genome) - read_len + 1, size=n_reads)
    # gather all read windows as a (n_reads, read_len) byte matrix
    idx = starts[:, None] + np.arange(read_len)[None, :]
    mat = garr[idx].copy()
    # strand 2: reverse complement (reads are always 5'->3')
    rev = g.random(n_reads) < 0.5
    comp = np.zeros(256, dtype=np.uint8)
    comp[ord("A")], comp[ord("T")] = ord("T"), ord("A")
    comp[ord("C")], comp[ord("G")] = ord("G"), ord("C")
    mat[rev] = comp[mat[rev]][:, ::-1]
    # substitution errors: replace with one of the other 3 nucleotides
    err = g.random(mat.shape) < error_rate
    if err.any():
        cur = mat[err]
        # map current base to its 0..3 code, add 1..3 mod 4
        code = np.zeros(256, dtype=np.uint8)
        code[ord("A")], code[ord("C")], code[ord("G")], code[ord("T")] = 0, 1, 2, 3
        newc = (code[cur] + g.integers(1, 4, size=cur.shape)) % 4
        mat[err] = _NTS[newc]
    # N dropouts
    nmask = g.random(mat.shape) < n_rate
    mat[nmask] = ord("N")
    seqs = [bytes(row).decode() for row in mat]
    return pd.DataFrame({"read_id": np.arange(n_reads, dtype=np.int64), "seq": seqs})


def reads_df(spark: SparkSession, reads: pd.DataFrame) -> DataFrame:
    """Ship simulated reads into Spark (the FASTQ-on-HDFS substitute)."""
    return spark.createDataFrame(reads)


@dataclass(frozen=True)
class DatasetSpec:
    """One Table-I dataset scaled to laptop size (see DESIGN.md)."""

    name: str
    paper_name: str
    ref_len: int
    n_reads: int
    read_len: int
    error_rate: float
    n_repeat_families: int
    seed: int

    def depth(self) -> float:
        return self.n_reads * self.read_len / self.ref_len


#: lite substitutes for paper Table I, ≈1/1000 scale (BI 1/2000);
#: read lengths and coverage depths match the paper so contig-length
#: statistics stay in the same regime.
DATASETS: dict[str, DatasetSpec] = {
    "hc2": DatasetSpec("hc2", "Homo Sapiens Chromosome 2", 48_170, 4_810, 100, 0.005, 18, 42),
    "hcx": DatasetSpec("hcx", "Homo Sapiens Chromosome X", 96_301, 9_260, 100, 0.005, 36, 43),
    "hc14": DatasetSpec("hc14", "Human Chromosome 14", 88_000, 18_250, 101, 0.005, 33, 44),
    "bi": DatasetSpec("bi", "Bombus Impatiens", 125_000, 37_800, 155, 0.005, 46, 45),
}


def make_dataset(
    spark: SparkSession, name: str, *, scale: float = 1.0
) -> tuple[str, DataFrame]:
    """(reference genome, reads DataFrame) for a registry dataset.

    ``scale`` shrinks both the reference and the read count (coverage
    depth is preserved); unit tests use ``scale`` ≈ 0.05.
    """
    spec = DATASETS[name]
    ref_len = max(2 * spec.read_len, int(spec.ref_len * scale))
    n_reads = max(50, int(spec.n_reads * scale))
    genome = random_genome(
        ref_len,
        seed=spec.seed,
        n_repeat_families=max(1, int(spec.n_repeat_families * scale)),
    )
    reads = simulate_reads(
        genome,
        n_reads=n_reads,
        read_len=spec.read_len,
        error_rate=spec.error_rate,
        seed=spec.seed + 1,
    )
    return genome, reads_df(spark, reads)
