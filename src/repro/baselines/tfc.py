"""TFC baseline (Piramuthu & Sikora 2009), single iteration.

TFC "generates all legal features based on the current feature pool and
all available operators, then selects the best features from all candidate
features by using information gain" (paper §II). With the evaluation
protocol's setup that is: every unordered feature pair × the six
arithmetic-op variants, scored by single-feature IG, keeping the top 2·M
candidates (base ∪ generated) — the benchmark tables run one iteration.

The exhaustive O(N·M²) generation is the point of this baseline (it is why
TFC's Table V times explode); generation is streamed pair-by-pair so
memory stays O(N) even though all M(M−1)/2·6 features are evaluated.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass
from itertools import combinations

import numpy as np
import pandas as pd

from ..core.iv import equal_freq_bin
from ..core.operators import DEFAULT_BINARY_OPS, pair_specs
from ..core.plan import FeaturePlan, FeatureSpec
from .info_gain import info_gain, info_gain_from_codes

__all__ = ["TFCPipeline"]


@dataclass
class TFCPipeline:
    operators: tuple[str, ...] = DEFAULT_BINARY_OPS
    top_k: int | None = None  # default 2·M
    bins: int = 10

    def fit(self, train: pd.DataFrame, label_col: str, valid=None) -> FeaturePlan:
        if valid is not None:
            train = pd.concat([train, valid], ignore_index=True)
        feature_cols = [c for c in train.columns if c != label_col]
        y = train[label_col].to_numpy().astype(bool)
        m = len(feature_cols)
        top_k = self.top_k or 2 * m
        data = {c: train[c].to_numpy(dtype=np.float64) for c in feature_cols}

        # heap of (ig, tiebreak_name, spec_or_None) keeps the best top_k
        heap: list[tuple[float, str, FeatureSpec | None]] = []

        def offer(ig: float, name: str, spec: FeatureSpec | None):
            item = (ig, name, spec)
            if len(heap) < top_k:
                heapq.heappush(heap, item)
            elif item > heap[0]:
                heapq.heapreplace(heap, item)

        for c in feature_cols:
            offer(info_gain(data[c], y, self.bins), c, None)
        for a, b in combinations(feature_cols, 2):
            for op_name, inputs in pair_specs(a, b, self.operators):
                spec = FeatureSpec(op_name, inputs)
                col = spec.operator.np_fn(data[inputs[0]], data[inputs[1]])
                codes = equal_freq_bin(col, self.bins)
                offer(info_gain_from_codes(codes, y), spec.name, spec)

        chosen = sorted(heap, reverse=True)
        specs = [spec for _ig, _n, spec in chosen if spec is not None]
        outputs = [name for _ig, name, _s in chosen]
        return FeaturePlan(specs, outputs, label_col).pruned()
