"""Synthetic stand-ins for the paper's evaluation datasets (Table 2).

The paper clusters 12 real datasets plus 3 held-out ones (Spam,
Shuttle, MSD). None can be downloaded offline, so each is replaced by a
deterministic Gaussian-mixture stand-in matching the original's
dimensionality and qualitative clusterability ("assembly"), with n
scaled ≈ ×1/100 (see DESIGN.md §3 for the substitution argument):

* low-d spatial data (NYC, Europe, Road, Conflong, Skin) → tight,
  well-separated mixtures — the regime where Ball-tree batch pruning
  dominates;
* high-d sensor/census data (BigCross, Covtype, Census, Kegg*) →
  moderately assembled mixtures with noise;
* Power / Mnist / MSD → dispersed, noise-heavy clouds where index
  pruning collapses (the paper's UniK-switches-to-sequential cases).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..synth_data import gaussian_mixture


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    paper_n: int      # n in Table 2
    n: int            # our scaled n
    d: int
    n_centers: int    # mixture components
    cluster_std: float
    uniform_frac: float
    seed: int

    def load(self) -> np.ndarray:
        return gaussian_mixture(
            n=self.n, d=self.d, n_centers=self.n_centers,
            cluster_std=self.cluster_std, uniform_frac=self.uniform_frac,
            seed=self.seed,
        )


#: Table-2 datasets. "assembly" encoded via cluster_std / uniform_frac.
SPECS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("BigCross", 1_160_000, 12000, 57, 32, 1.2, 0.05, 101),
        DatasetSpec("Conflong", 165_000, 6000, 3, 12, 0.6, 0.05, 102),
        DatasetSpec("Covtype", 581_000, 8000, 55, 20, 1.5, 0.10, 103),
        DatasetSpec("Europe", 169_000, 6000, 2, 40, 0.4, 0.05, 104),
        DatasetSpec("KeggDirect", 53_400, 4000, 24, 16, 1.0, 0.08, 105),
        DatasetSpec("KeggUndirect", 65_500, 4000, 29, 16, 1.0, 0.08, 106),
        DatasetSpec("NYC", 3_500_000, 15000, 2, 60, 0.15, 0.02, 107),
        DatasetSpec("Skin", 245_000, 6000, 4, 10, 0.8, 0.05, 108),
        DatasetSpec("Power", 2_070_000, 10000, 9, 8, 3.0, 0.40, 109),
        DatasetSpec("Road", 434_000, 6000, 4, 30, 0.4, 0.05, 110),
        DatasetSpec("Census", 2_450_000, 8000, 68, 24, 1.8, 0.15, 111),
        DatasetSpec("Mnist", 60_000, 2000, 784, 10, 4.0, 0.30, 112),
    ]
}

#: Held-out datasets used only to test UTune generalization (§7.3.2).
HOLDOUT_SPECS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("Spam", 4_601, 2000, 57, 12, 1.4, 0.10, 201),
        DatasetSpec("Shuttle", 58_000, 4000, 9, 7, 0.9, 0.08, 202),
        DatasetSpec("MSD", 515_000, 4000, 90, 15, 2.5, 0.30, 203),
    ]
}

ALL_SPECS = {**SPECS, **HOLDOUT_SPECS}


def load(name: str) -> np.ndarray:
    """Load a stand-in dataset by its Table-2 name."""
    return ALL_SPECS[name].load()
