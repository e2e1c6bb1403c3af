"""Kernel registry — importing this package registers every algorithm."""
from .base import REGISTRY, Kernel, make_kernel
from . import (  # noqa: F401  (registration side effects)
    annular,
    blockvector,
    drake,
    driftk,
    elkan,
    exponion,
    fullk,
    hamerly,
    heap,
    index_kernel,
    lloyd,
    pami20,
    search,
    unik,
    yinyang,
)

#: The paper's sequential methods (§4) in presentation order.
SEQUENTIAL = [
    "elka", "hame", "drak", "yinyang", "regroup", "heap",
    "annu", "expo", "drift", "vector", "pami20", "search", "full",
]
#: Index-based methods (§3).
INDEX_BASED = ["index", "kdindex"]

__all__ = ["REGISTRY", "Kernel", "make_kernel", "SEQUENTIAL", "INDEX_BASED"]
