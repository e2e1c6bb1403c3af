"""Full — every bound knob turned on (Figure 1 / footnote 5).

Elkan's per-pair inter+drift bounds, a Yinyang-style global/group
filter layered on top (group minima recomputed from the lb matrix each
iteration), and the block-vector pre-check before every exact distance.
Maximum pruning ratio, maximum bound-maintenance overhead — the paper's
demonstration that fewer distances ≠ faster clustering.
"""
from __future__ import annotations

from .base import register
from .blockvector import BlockVectorKernel


@register("full")
class FullKernel(BlockVectorKernel):
    needs = frozenset({"cc", "s", "c2", "blocks", "groups"})
    use_groups = True
    fixed_groups = True
