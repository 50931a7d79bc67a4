"""SAFE's three-step feature selection (paper §IV-C, Algorithms 3–4).

Shared by SAFE itself and the RAND/IMP ablations (which by definition run
"the same feature selection process as SAFE", §V-A1):

1. drop candidates with IV ≤ α (uninformative);
2. drop the lower-IV member of each |Pearson| > θ pair (redundant);
3. rank survivors by XGBoost average split gain, keep the top ``top_k``.

Degenerate guard: if *no* candidate clears α the IV filter would empty the
feature set; we then fall back to the ``top_k`` highest-IV candidates so a
downstream model can still be trained (the paper does not discuss this
case; it only arises on pathological inputs).
"""
from __future__ import annotations

import numpy as np

from .correlation import DEFAULT_THETA, remove_redundant
from .iv import DEFAULT_ALPHA, DEFAULT_BETA

__all__ = ["select_features", "SelectionReport"]


class SelectionReport(dict):
    """Dict of per-stage survivors: keys candidates/informative/nonredundant/selected, iv, importance."""


def select_features(
    engine,
    candidates: list[str],
    *,
    alpha: float = DEFAULT_ALPHA,
    beta: int = DEFAULT_BETA,
    theta: float = DEFAULT_THETA,
    top_k: int | None = None,
    gbdt_params: dict | None = None,
) -> SelectionReport:
    """Run the three-stage selection over ``candidates`` on ``engine``."""
    top_k = top_k or len(candidates)
    iv = engine.iv(candidates, beta=beta)

    informative = [c for c in candidates if iv[c] > alpha]
    if not informative:  # degenerate guard, see module docstring
        informative = sorted(candidates, key=lambda c: (-iv[c], c))[:top_k]

    if len(informative) > 1:
        corr = engine.corr(informative)
        nonredundant = remove_redundant(informative, iv, corr, theta)
    else:
        nonredundant = list(informative)

    model = engine.fit_gbdt(nonredundant, **(gbdt_params or {}))
    imp = model.feature_importances()
    order = sorted(
        range(len(nonredundant)), key=lambda i: (-imp[i], nonredundant[i])
    )
    selected = [nonredundant[i] for i in order[:top_k]]
    return SelectionReport(
        candidates=list(candidates),
        iv=iv,
        informative=informative,
        nonredundant=nonredundant,
        importance={nonredundant[i]: float(imp[i]) for i in range(len(nonredundant))},
        selected=selected,
    )
