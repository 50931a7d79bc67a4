"""FCTree baseline (Fan et al., SDM 2010).

"FCTree trains a decision tree and performs feature generation by applying
several sequential transformations to the original feature, and selects
features according to information gain on each node of the decision tree.
Once a tree is built, features chosen at internal decision nodes are used
to obtain the constructed features." (paper §II)

Implementation: a single decision tree is grown greedily; at every node,
candidate splitters are the original features plus ``n_e`` freshly
constructed features (random pair × random arithmetic op, drawn from the
run's RNG). Splits maximise information gain over the node's rows.
Constructed features chosen at internal nodes are harvested; the output
feature set is those constructions plus the highest-IG original features,
capped at 2·M (the benchmark protocol reduces FCTree's output to 2·M by
information gain, §V-A1).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from ..core.gain_ratio import _entropy
from ..core.operators import DEFAULT_BINARY_OPS, BINARY_OPERATORS
from ..core.plan import FeaturePlan, FeatureSpec
from .info_gain import info_gain

__all__ = ["FCTreePipeline"]


def _node_best_threshold(x: np.ndarray, y: np.ndarray, n_bins: int = 32):
    """(best IG, threshold) of one feature over a node's rows."""
    uniq = np.unique(x)
    if len(uniq) <= 1:
        return 0.0, None
    if len(uniq) <= n_bins:
        thresholds = (uniq[:-1] + uniq[1:]) / 2.0
    else:
        qs = np.unique(np.quantile(x, np.linspace(0, 1, n_bins + 1)[1:-1]))
        thresholds = qs
    n = len(y)
    h_root = _entropy(np.array([y.sum(), n - y.sum()], dtype=np.float64))
    order = np.argsort(x, kind="mergesort")
    xs, ys = x[order], y[order]
    pos_cum = np.cumsum(ys)
    best_ig, best_thr = 0.0, None
    for thr in thresholds:
        k = int(np.searchsorted(xs, thr, side="right"))
        if k == 0 or k == n:
            continue
        lp = float(pos_cum[k - 1])
        rp = float(pos_cum[-1] - lp)
        h = (k / n) * _entropy(np.array([lp, k - lp])) + ((n - k) / n) * _entropy(
            np.array([rp, (n - k) - rp])
        )
        ig = h_root - h
        if ig > best_ig:
            best_ig, best_thr = float(ig), float(thr)
    return best_ig, best_thr


@dataclass
class FCTreePipeline:
    operators: tuple[str, ...] = DEFAULT_BINARY_OPS
    n_e: int = 10  # constructed candidates per node
    max_depth: int = 6
    min_samples_split: int = 40
    top_k: int | None = None  # default 2·M
    random_state: int = 0
    bins: int = 10

    def fit(self, train: pd.DataFrame, label_col: str, valid=None) -> FeaturePlan:
        if valid is not None:
            train = pd.concat([train, valid], ignore_index=True)
        feature_cols = [c for c in train.columns if c != label_col]
        y_all = train[label_col].to_numpy().astype(np.int64)
        m = len(feature_cols)
        top_k = self.top_k or 2 * m
        data = {c: train[c].to_numpy(dtype=np.float64) for c in feature_cols}
        rng = np.random.default_rng(self.random_state)
        harvested: list[FeatureSpec] = []
        # ordered-variant op pool: (op, flip) pairs
        op_pool: list[tuple[str, bool]] = []
        for name in self.operators:
            op_pool.append((name, False))
            if not BINARY_OPERATORS[name].commutative:
                op_pool.append((name, True))

        def candidates_at_node() -> list[FeatureSpec]:
            out = []
            for _ in range(self.n_e):
                i, j = rng.choice(m, size=2, replace=False)
                op_name, flip = op_pool[rng.integers(len(op_pool))]
                a, b = feature_cols[i], feature_cols[j]
                if flip:
                    a, b = b, a
                if not BINARY_OPERATORS[op_name].commutative:
                    out.append(FeatureSpec(op_name, (a, b)))
                else:
                    lo, hi = sorted((a, b))
                    out.append(FeatureSpec(op_name, (lo, hi)))
            return out

        def build(idx: np.ndarray, depth: int) -> None:
            y = y_all[idx]
            if (
                depth >= self.max_depth
                or len(idx) < self.min_samples_split
                or y.sum() == 0
                or y.sum() == len(y)
            ):
                return
            best = (0.0, None, None, None)  # ig, colvals, thr, spec
            for c in feature_cols:
                ig, thr = _node_best_threshold(data[c][idx], y)
                if thr is not None and ig > best[0]:
                    best = (ig, data[c][idx], thr, None)
            for spec in candidates_at_node():
                col = spec.operator.np_fn(
                    data[spec.inputs[0]][idx], data[spec.inputs[1]][idx]
                )
                ig, thr = _node_best_threshold(col, y)
                if thr is not None and ig > best[0]:
                    best = (ig, col, thr, spec)
            _ig, col, thr, spec = best
            if thr is None:
                return
            if spec is not None:
                harvested.append(spec)
            go_left = col <= thr
            build(idx[go_left], depth + 1)
            build(idx[~go_left], depth + 1)

        build(np.arange(len(y_all)), 0)

        # score harvested + originals by IG, keep top 2·M
        scored: list[tuple[float, str, FeatureSpec | None]] = []
        seen: set[str] = set()
        yb = y_all.astype(bool)
        for c in feature_cols:
            scored.append((info_gain(data[c], yb, self.bins), c, None))
            seen.add(c)
        for spec in harvested:
            if spec.name in seen:
                continue
            seen.add(spec.name)
            col = spec.operator.np_fn(data[spec.inputs[0]], data[spec.inputs[1]])
            scored.append((info_gain(col, yb, self.bins), spec.name, spec))
        scored.sort(reverse=True)
        chosen = scored[:top_k]
        specs = [s for _ig, _n, s in chosen if s is not None]
        outputs = [n for _ig, n, _s in chosen]
        return FeaturePlan(specs, outputs, label_col).pruned()
