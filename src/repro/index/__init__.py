"""Index substrates for batch (node-level) k-means assignment (§3)."""
from .base import ArrayTree, build_tree
from .balltree import build_balltree, DEFAULT_CAPACITY
from .covertree import build_covertree
from .hkt import build_hkt
from .kdtree import KDTree, build_kdtree
from .mtree import build_mtree

#: Ball-shaped index builders usable by the generic index kernel.
BALL_INDEXES = {
    "balltree": build_balltree,
    "hkt": build_hkt,
    "mtree": build_mtree,
    "covertree": build_covertree,
}

__all__ = [
    "ArrayTree", "KDTree", "build_tree", "build_balltree", "build_kdtree",
    "build_hkt", "build_mtree", "build_covertree", "BALL_INDEXES",
    "DEFAULT_CAPACITY",
]
