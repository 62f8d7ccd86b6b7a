"""PPA-assembler core: the paper's five operations (§IV-B, Fig. 10)
plus vertex/edge formats (§IV-A), composed by :mod:`repro.core.pipeline`.
"""

from repro.core.adjacency import ITEMS_SCHEMA, items_from_vertices, vertex_types  # noqa: F401
from repro.core.dbg import build_dbg  # noqa: F401
from repro.core.labeling import label_contigs  # noqa: F401
from repro.core.merging import merge_contigs  # noqa: F401
from repro.core.bubble import filter_bubbles  # noqa: F401
from repro.core.tips import remove_tips  # noqa: F401
from repro.core.pipeline import assemble  # noqa: F401
