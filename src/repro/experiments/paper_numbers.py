"""The numbers published in the paper's evaluation tables, kept next to
the reproduction harness so EXPERIMENTS.md can diff paper vs measured.

All values transcribed from §V of Yan et al., ICDE 2018.
"""

# Table I — datasets (M = 1e6; bp = base pairs)
PAPER_TABLE1 = {
    "hc2": {"name": "Homo Sapiens Chromosome 2", "n_reads": 4_810_000, "read_len": 100, "ref_len": 48_170_570},
    "hcx": {"name": "Homo Sapiens Chromosome X", "n_reads": 9_260_000, "read_len": 100, "ref_len": 96_301_240},
    "hc14": {"name": "Human Chromosome 14", "n_reads": 18_250_000, "read_len": 101, "ref_len": None},
    "bi": {"name": "Bombus Impatiens", "n_reads": 151_550_000, "read_len": 155, "ref_len": None},
}

# Table II — LR vs S-V labeling unambiguous k-mers
# (supersteps, messages, runtime seconds)
PAPER_TABLE2 = {
    "hcx": {"lr": (26, 2_325e6, 93), "sv": (86, 5_913e6, 212)},
    "hc2": {"lr": (28, 1_498e6, 58), "sv": (93, 3_644e6, 128)},
    "hc14": {"lr": (67, 2_342e6, 213), "sv": (93, 6_852e6, 415)},
    "bi": {"lr": (60, 6_705e6, 239), "sv": (86, 22_958e6, 723)},
}

# Table III — LR vs S-V labeling contigs (second round)
PAPER_TABLE3 = {
    "hcx": {"lr": (32, 2.16e6, 0.51), "sv": (44, 5.28e6, 0.67)},
    "hc2": {"lr": (12, 1.05e6, 0.20), "sv": (37, 2.74e6, 0.50)},
    "hc14": {"lr": (22, 6.04e6, 1.06), "sv": (51, 22.46e6, 1.83)},
    "bi": {"lr": (38, 74.36e6, 3.77), "sv": (65, 280.04e6, 10.26)},
}

# Table IV — quality on HC-2 (reference available)
PAPER_TABLE4 = {
    "n_contigs": {"PPA": 22_707, "ABySS": 29_231, "Ray": 26_739, "SWAP": 12_477},
    "total_length": {"PPA": 36_878_742, "ABySS": 31_426_810, "Ray": 20_854_349, "SWAP": 8_232_160},
    "n50": {"PPA": 2_070, "ABySS": 1_184, "Ray": 779, "SWAP": 640},
    "largest_contig": {"PPA": 16_376, "ABySS": 7_166, "Ray": 3_248, "SWAP": 1_982},
    "gc_pct": {"PPA": 40.89, "ABySS": 41.77, "Ray": 41.03, "SWAP": 41.21},
    "n_misassemblies": {"PPA": 1, "ABySS": 4, "Ray": 1, "SWAP": 167},
    "misassembled_length": {"PPA": 1_366, "ABySS": 3_666, "Ray": 520, "SWAP": 115_998},
    "unaligned_length": {"PPA": 24, "ABySS": 427, "Ray": 1_227, "SWAP": 47_810},
    "genome_fraction_pct": {"PPA": 76.285, "ABySS": 65.104, "Ray": 42.981, "SWAP": 16.963},
    "mismatches_per_100kbp": {"PPA": 0.43, "ABySS": 13.75, "Ray": 1.04, "SWAP": 43.02},
    "indels_per_100kbp": {"PPA": 0.03, "ABySS": 0.10, "Ray": 0.09, "SWAP": 5.32},
    "largest_alignment": {"PPA": 16_376, "ABySS": 7_166, "Ray": 3_248, "SWAP": 1_982},
}

# Table V — quality on HC-14 (no reference)
PAPER_TABLE5 = {
    "n_contigs": {"PPA": 41_445, "ABySS": 18_008, "Ray": 45_984, "SWAP": 47_252},
    "total_length": {"PPA": 62_667_868, "ABySS": 26_586_604, "Ray": 63_456_459, "SWAP": 63_752_569},
    "n50": {"PPA": 1_891, "ABySS": 1_847, "Ray": 1_641, "SWAP": 1_605},
    "largest_contig": {"PPA": 16_069, "ABySS": 15_744, "Ray": 15_116, "SWAP": 13_251},
}

# §V prose: N50 on HC-2 was 1074 after round 1 and 2070 after round 2,
# and the HC-2 DBG had 46.97M vertices → 1.00M after merging → 68,264
# after the second merge.
PAPER_HC2_N50_ROUND1 = 1_074
PAPER_HC2_N50_ROUND2 = 2_070
