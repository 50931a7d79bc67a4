"""Synthetic stand-ins for the paper's evaluation datasets (Tables IV, VII).

No network access ⇒ the 12 OpenML benchmark datasets and the 3 Ant
Financial fraud datasets are replaced by deterministic generators that
match each dataset's train/valid/test/dim *shape* (scaled down — see
DESIGN.md §5) and whose labels are driven by planted pairwise interactions
(x·y, x/y, x±y) of a feature subset plus linear terms and noise dims.
That planted structure is exactly what pairwise arithmetic feature
engineering can recover, so the orderings the paper reports (ORIG <
baselines < SAFE; big lifts for linear models, small for XGB) carry over.

Per-dataset knobs (interaction vs linear weight, label temperature,
positive rate, noise dims) are tuned so the ORIG columns of Table III land
in roughly the paper's difficulty bands (e.g. ``valley``: near-chance
ORIG for linear models; ``banknote``: ~99 AUC for everything).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

__all__ = [
    "DatasetSpec",
    "BENCHMARK_DATASETS",
    "BUSINESS_DATASETS",
    "make_dataset",
    "dataset_info_rows",
]


@dataclass(frozen=True)
class DatasetSpec:
    """Shape + generative knobs of one synthetic dataset."""

    name: str
    n_train: int
    n_valid: int
    n_test: int
    dim: int
    n_pairs: int  # planted interaction pairs
    interaction_weight: float
    linear_weight: float
    logit_scale: float  # label sharpness (difficulty); higher = easier
    pos_rate: float
    seed: int
    paper_shape: tuple[int, int, int, int] = (0, 0, 0, 0)  # train/valid/test/dim in the paper

    @property
    def n_total(self) -> int:
        return self.n_train + self.n_valid + self.n_test


# name            n_tr  n_va  n_te  dim  pairs  w_int  w_lin  scale  pos   seed  paper (tr, va, te, dim)
BENCHMARK_DATASETS: tuple[DatasetSpec, ...] = (
    DatasetSpec("valley", 900, 0, 312, 60, 8, 1.0, 0.0, 2.2, 0.50, 101, (900, 0, 312, 100)),
    DatasetSpec("banknote", 1000, 0, 372, 4, 1, 0.6, 1.0, 6.0, 0.45, 102, (1000, 0, 372, 4)),
    DatasetSpec("gina", 1400, 0, 334, 100, 10, 0.8, 0.5, 2.5, 0.49, 103, (2800, 0, 668, 970)),
    DatasetSpec("spambase", 1900, 0, 400, 40, 6, 0.7, 0.8, 3.0, 0.39, 104, (3800, 0, 801, 57)),
    DatasetSpec("phoneme", 2250, 0, 452, 5, 2, 0.9, 0.6, 2.8, 0.29, 105, (4500, 0, 904, 5)),
    DatasetSpec("wind", 2500, 0, 787, 14, 2, 0.3, 1.0, 2.4, 0.47, 106, (5000, 0, 1574, 14)),
    DatasetSpec("ailerons", 2250, 500, 688, 40, 3, 0.3, 1.0, 3.2, 0.42, 107, (9000, 2000, 2750, 40)),
    DatasetSpec("eeg-eye", 2500, 500, 745, 14, 6, 1.0, 0.1, 2.0, 0.45, 108, (10000, 2000, 2980, 14)),
    DatasetSpec("magic", 3250, 750, 755, 10, 3, 0.6, 0.7, 2.2, 0.35, 109, (13000, 3000, 3020, 10)),
    DatasetSpec("nomao", 2750, 750, 750, 60, 6, 0.5, 1.0, 3.5, 0.29, 110, (22000, 6000, 6000, 118)),
    DatasetSpec("bank", 3520, 400, 600, 40, 4, 0.5, 0.5, 1.0, 0.12, 111, (35211, 4000, 6000, 51)),
    DatasetSpec("vehicle", 3000, 926, 1000, 60, 6, 0.6, 0.8, 2.3, 0.26, 112, (60000, 18528, 20000, 100)),
)

BUSINESS_DATASETS: tuple[DatasetSpec, ...] = (
    DatasetSpec("Data1", 60_000, 15_000, 15_000, 40, 4, 0.7, 1.0, 2.8, 0.03, 201, (2_502_617, 625_655, 625_655, 81)),
    DatasetSpec("Data2", 80_000, 20_000, 20_000, 30, 2, 0.25, 1.0, 1.6, 0.03, 202, (7_282_428, 1_820_607, 1_820_607, 44)),
    DatasetSpec("Data3", 100_000, 25_000, 25_000, 40, 3, 0.4, 1.0, 1.8, 0.03, 203, (8_000_000, 2_000_000, 2_000_000, 73)),
)

LABEL_COL = "label"


def _raw_features(g: np.random.Generator, n: int, dim: int) -> np.ndarray:
    """Mixed-scale feature matrix: normals, uniforms, lognormals (industrial
    data is never all-Gaussian; ratio features only help if scales vary)."""
    X = np.empty((n, dim))
    for j in range(dim):
        kind = j % 3
        if kind == 0:
            X[:, j] = g.normal(0, 1 + (j % 5) * 0.5, n)
        elif kind == 1:
            X[:, j] = g.uniform(-2, 2, n) * (1 + (j % 4))
        else:
            X[:, j] = g.lognormal(0.0, 0.6, n) - 1.0
    return X


def _planted_logit(
    X: np.ndarray, spec: DatasetSpec, g: np.random.Generator
) -> np.ndarray:
    dim = spec.dim
    n_inf = max(2, min(dim, 2 * spec.n_pairs + 3))  # informative prefix
    score = np.zeros(len(X))
    # pairwise interactions over the informative prefix
    pair_ops = ("mul", "div", "sub")
    for p in range(spec.n_pairs):
        i, j = g.choice(n_inf, size=2, replace=False)
        coef = spec.interaction_weight * g.uniform(0.8, 1.6) * g.choice([-1.0, 1.0])
        kind = pair_ops[int(g.integers(len(pair_ops)))]
        a, b = X[:, i], X[:, j]
        if kind == "mul":
            term = a * b
        elif kind == "div":
            term = a / (np.abs(b) + 0.5)
        else:
            term = np.abs(a - b)
        score += coef * (term - term.mean()) / (term.std() + 1e-9)
        # weak marginal effect for each participant: real interacting
        # features are rarely *pure* interactions, and SAFE's IV filter
        # (marginal by construction) needs a marginal trace to keep them
        for col in (a, b):
            score += 0.25 * coef * (col - col.mean()) / (col.std() + 1e-9)
    # linear part
    n_lin = min(dim, 4)
    for j in range(n_lin):
        coef = spec.linear_weight * g.uniform(0.5, 1.2) * g.choice([-1.0, 1.0])
        col = X[:, j]
        score += coef * (col - col.mean()) / (col.std() + 1e-9)
    score = (score - score.mean()) / (score.std() + 1e-9)
    return spec.logit_scale * score


def _intercept_for_rate(logit: np.ndarray, pos_rate: float) -> float:
    """Bisection for b with mean(sigmoid(logit + b)) ≈ pos_rate."""
    lo, hi = -30.0, 30.0
    for _ in range(60):
        mid = (lo + hi) / 2
        p = 1.0 / (1.0 + np.exp(-(logit + mid)))
        if p.mean() > pos_rate:
            hi = mid
        else:
            lo = mid
    return (lo + hi) / 2


def make_dataset(
    spec: DatasetSpec,
) -> tuple[pd.DataFrame, pd.DataFrame | None, pd.DataFrame]:
    """Deterministic (train, valid | None, test) pandas frames.

    Columns ``f0..f{dim-1}`` + ``label``; datasets with ``n_valid == 0``
    return ``None`` for the validation frame (paper: "for the data set
    whose sample size is less than 10000, no validation set is splitted").
    """
    g = np.random.default_rng(spec.seed)
    X = _raw_features(g, spec.n_total, spec.dim)
    logit = _planted_logit(X, spec, g)
    logit = logit + _intercept_for_rate(logit, spec.pos_rate)
    y = (g.random(spec.n_total) < 1.0 / (1.0 + np.exp(-logit))).astype(np.int64)
    pdf = pd.DataFrame(X, columns=[f"f{i}" for i in range(spec.dim)])
    pdf[LABEL_COL] = y
    tr = pdf.iloc[: spec.n_train].reset_index(drop=True)
    va = (
        pdf.iloc[spec.n_train : spec.n_train + spec.n_valid].reset_index(drop=True)
        if spec.n_valid
        else None
    )
    te = pdf.iloc[spec.n_train + spec.n_valid :].reset_index(drop=True)
    return tr, va, te


def dataset_info_rows(specs: tuple[DatasetSpec, ...]) -> pd.DataFrame:
    """Tables IV / VII: per-dataset shapes, ours next to the paper's."""
    rows = []
    for s in specs:
        ptr, pva, pte, pdim = s.paper_shape
        rows.append(
            {
                "Dataset": s.name,
                "#Train": s.n_train,
                "#Valid": s.n_valid or "-",
                "#Test": s.n_test,
                "#Dim": s.dim,
                "paper #Train": ptr,
                "paper #Valid": pva or "-",
                "paper #Test": pte,
                "paper #Dim": pdim,
            }
        )
    return pd.DataFrame(rows)
