"""Mining feature-combination relations from tree paths (paper §IV-B1).

From the trained booster's root→leaf-parent paths P = {p_1, …, p_k}, the
candidate generation space is every subset of distinct features on one
path (Eq. 4) — here sizes 1 and 2, since the evaluation uses unary- and
binary-operator generation only. Each combination carries the union of the
member features' split values collected over every path that produced it
(a feature may split several times in one path: V_i is a set).
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import combinations

__all__ = ["FeatureCombo", "mine_combos"]


@dataclass(frozen=True)
class FeatureCombo:
    """An unordered combination of base features with their split values."""

    features: tuple[int, ...]  # sorted base-feature indices
    split_values: tuple[tuple[float, ...], ...]  # per feature, sorted

    @property
    def size(self) -> int:
        return len(self.features)

    def n_cells(self) -> int:
        """∏ (|V_i| + 1): number of partition cells (Algorithm 2, l.3)."""
        out = 1
        for vs in self.split_values:
            out *= len(vs) + 1
        return out


def mine_combos(
    paths: list[list[tuple[int, float]]],
    sizes: tuple[int, ...] = (2,),
    max_cells: int = 4096,
) -> list[FeatureCombo]:
    """All size-``sizes`` combinations of distinct features per path.

    Identical feature sets arising from different paths are merged by
    unioning their split values (the paper notes such duplicates make the
    realised search space much smaller than Eq. 5's bound). ``max_cells``
    guards against degenerate combos whose partition would explode.
    """
    merged: dict[tuple[int, ...], dict[int, set[float]]] = {}
    for path in paths:
        values: dict[int, set[float]] = {}
        for f, v in path:
            values.setdefault(f, set()).add(v)
        feats = sorted(values)
        for size in sizes:
            for subset in combinations(feats, size):
                acc = merged.setdefault(subset, {f: set() for f in subset})
                for f in subset:
                    acc[f] |= values[f]
    out: list[FeatureCombo] = []
    for subset in sorted(merged):
        acc = merged[subset]
        combo = FeatureCombo(
            features=subset,
            split_values=tuple(tuple(sorted(acc[f])) for f in subset),
        )
        if combo.n_cells() <= max_cells:
            out.append(combo)
    return out
