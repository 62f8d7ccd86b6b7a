"""Behaviour-preserving PySpark analogues of the paper's comparators
(ABySS, Ray, SWAP-Assembler) — see DESIGN.md "Baseline substitutions".
"""

from repro.baselines.abyss_like import abyss_assemble, build_abyss_items  # noqa: F401
from repro.baselines.ray_like import ray_assemble  # noqa: F401
from repro.baselines.swap_like import swap_assemble  # noqa: F401
