"""Execution-time experiment (paper §V-A4, Table V).

Wall-clock seconds of each method's ``fit`` on each benchmark dataset.
The claim under test is the *shape*: SAFE/RAND/IMP are roughly
interchangeable and orders of magnitude cheaper than TFC (exhaustive
O(N·M²) generation) and FCTree (per-node candidate scans).
"""
from __future__ import annotations

import pandas as pd

from .datasets import LABEL_COL, DatasetSpec, make_dataset
from .runner import fit_method

__all__ = ["time_methods"]


def time_methods(
    spec: DatasetSpec,
    methods: tuple[str, ...] = ("FCT", "TFC", "RAND", "IMP", "SAFE"),
    seed: int = 0,
) -> dict[str, float]:
    """{method: fit seconds} on one dataset."""
    train, valid, _test = make_dataset(spec)
    out: dict[str, float] = {}
    for method in methods:
        res = fit_method(method, train, LABEL_COL, valid, seed=seed)
        out[method] = res.fit_seconds
    return out


def timing_table(
    specs: tuple[DatasetSpec, ...],
    methods: tuple[str, ...] = ("FCT", "TFC", "RAND", "IMP", "SAFE"),
    seed: int = 0,
) -> pd.DataFrame:
    """Table V layout: one row per dataset, one column per method."""
    rows = []
    for spec in specs:
        t = time_methods(spec, methods, seed)
        rows.append({"Dataset": spec.name, **{m: round(t[m], 2) for m in methods}})
    return pd.DataFrame(rows)
