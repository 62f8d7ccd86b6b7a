"""Genome/read simulation substrate (substitute for ART + NCBI/GAGE
datasets — see DESIGN.md "Dataset substitutions")."""

from repro.genome.simulate import (  # noqa: F401
    DATASETS,
    DatasetSpec,
    make_dataset,
    random_genome,
    reads_df,
    simulate_reads,
)
