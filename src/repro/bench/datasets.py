"""The 36 target datasets (paper Table III), synthetic substitutes.

Each roster entry mirrors a paper dataset's name, task type and shape —
with samples capped at 1000 and features at 32 to fit the repo's
wall-clock budget (DESIGN.md §3). The generator plants operator-set
interactions so feature engineering has real headroom, and per-dataset
seeds/noise/informative-counts vary so the roster spans easy and hard
tasks like the original mix does.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from ..synth_data import make_tabular

__all__ = ["DatasetSpec", "ROSTER", "load_dataset", "TABLE1_DATASETS"]

_MAX_SAMPLES = 1000
_MAX_FEATURES = 32


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    task: str  # 'C' or 'R'
    paper_samples: int
    paper_features: int
    seed: int

    @property
    def n_samples(self) -> int:
        return max(80, min(self.paper_samples, _MAX_SAMPLES))

    @property
    def n_features(self) -> int:
        return max(5, min(self.paper_features, _MAX_FEATURES))


# Order matches paper Table III top-to-bottom.
_ROWS = [
    ("Higgs Boson", "C", 50000, 28),
    ("A. Employee", "C", 32769, 9),
    ("PimaIndian", "C", 768, 8),
    ("SpectF", "C", 267, 44),
    ("SVMGuide3", "C", 1243, 21),
    ("German Credit", "C", 1001, 24),
    ("Bikeshare DC", "R", 10886, 11),
    ("Housing Boston", "R", 506, 13),
    ("Airfoil", "R", 1503, 5),
    ("AP. ovary", "C", 275, 10936),
    ("Lymphography", "C", 148, 18),
    ("Ionosphere", "C", 351, 34),
    ("Openml 618", "R", 1000, 50),
    ("Openml 589", "R", 1000, 25),
    ("Openml 616", "R", 500, 50),
    ("Openml 607", "R", 1000, 50),
    ("Openml 620", "R", 1000, 25),
    ("Openml 637", "R", 500, 50),
    ("Openml 586", "R", 1000, 25),
    ("Credit Default", "C", 30000, 25),
    ("Messidor features", "C", 1150, 19),
    ("Wine Q. Red", "C", 999, 12),
    ("Wine Q. White", "C", 4900, 12),
    ("SpamBase", "C", 4601, 57),
    ("AP. lung", "C", 203, 10936),
    ("credit-a", "C", 690, 6),
    ("diabetes", "C", 768, 8),
    ("fertility", "C", 100, 9),
    ("gisette", "C", 2100, 5000),
    ("hepatitis", "C", 155, 6),
    ("labor", "C", 57, 8),
    ("lymph", "C", 138, 10936),
    ("madelon", "C", 780, 500),
    ("megawatt1", "C", 253, 37),
    ("secom", "C", 470, 590),
    ("sonar", "C", 208, 60),
]

ROSTER: list[DatasetSpec] = [
    DatasetSpec(name=n, task=t, paper_samples=s, paper_features=f, seed=10 + i)
    for i, (n, t, s, f) in enumerate(_ROWS)
]

# Table I uses these four (NFS one-epoch timing).
TABLE1_DATASETS = ("PimaIndian", "credit-a", "diabetes", "German Credit")


def load_dataset(spec: DatasetSpec) -> tuple[pd.DataFrame, np.ndarray]:
    """Deterministically materialize a roster dataset."""
    g = np.random.default_rng(spec.seed)
    n_informative = int(g.integers(3, 7))
    noise = float(g.uniform(0.05, 0.35))
    return make_tabular(
        task=spec.task,
        n_samples=spec.n_samples,
        n_features=spec.n_features,
        n_informative=min(n_informative, spec.n_features),
        noise=noise,
        seed=spec.seed,
    )


def by_name(name: str) -> DatasetSpec:
    for s in ROSTER:
        if s.name == name:
            return s
    raise KeyError(name)
