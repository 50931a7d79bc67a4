"""The learned feature generation function Ψ (paper Eq. 1).

A :class:`FeaturePlan` is a closed-form, serialisable description of the
transform SAFE learns: an ordered list of generated-feature specs (operator
+ parent column names, where parents may themselves be generated features
from an earlier iteration) plus the final output column list. It applies
identically to a pandas frame (numpy ops) or a Spark DataFrame (Column
exprs) — the latter is the real-time-inference / distributed path.
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .operators import BINARY_OPERATORS, UNARY_OPERATORS

__all__ = ["FeatureSpec", "FeaturePlan", "spec_name"]


def spec_name(op: str, inputs: tuple[str, ...]) -> str:
    """Canonical, Spark-legal column name for a generated feature."""
    return f"{'_'.join(inputs)}__{op}"


@dataclass(frozen=True)
class FeatureSpec:
    """One generated feature: ``name = op(*inputs)``."""

    op: str
    inputs: tuple[str, ...]

    @property
    def name(self) -> str:
        return spec_name(self.op, self.inputs)

    @property
    def operator(self):
        table = UNARY_OPERATORS if len(self.inputs) == 1 else BINARY_OPERATORS
        return table[self.op]


@dataclass
class FeaturePlan:
    """Ψ: ordered generation specs + the selected output columns.

    ``specs`` is in dependency order (iteration k's specs may reference
    iteration <k outputs). ``output_columns`` mixes surviving original
    columns and generated names; ``label_col`` is carried through untouched
    when present.
    """

    specs: list[FeatureSpec] = field(default_factory=list)
    output_columns: list[str] = field(default_factory=list)
    label_col: str | None = None

    # -- bookkeeping -------------------------------------------------------
    def generated_outputs(self) -> list[str]:
        gen = {s.name for s in self.specs}
        return [c for c in self.output_columns if c in gen]

    def original_outputs(self) -> list[str]:
        gen = {s.name for s in self.specs}
        return [c for c in self.output_columns if c not in gen]

    def needed_specs(self) -> list[FeatureSpec]:
        """Specs transitively required by ``output_columns``, in order."""
        by_name = {s.name: s for s in self.specs}
        needed: set[str] = set()
        stack = [c for c in self.output_columns if c in by_name]
        while stack:
            name = stack.pop()
            if name in needed:
                continue
            needed.add(name)
            stack.extend(i for i in by_name[name].inputs if i in by_name)
        return [s for s in self.specs if s.name in needed]

    def pruned(self) -> "FeaturePlan":
        """Copy with unused specs dropped (what you'd export to serving)."""
        return FeaturePlan(self.needed_specs(), list(self.output_columns), self.label_col)

    # -- application -------------------------------------------------------
    def apply_pandas(self, pdf: pd.DataFrame) -> pd.DataFrame:
        """Ψ(pdf) → frame with exactly ``output_columns`` (+ label if present)."""
        cols: dict[str, np.ndarray] = {
            c: pdf[c].to_numpy(dtype=np.float64) for c in pdf.columns if c != self.label_col
        }
        for s in self.needed_specs():
            cols[s.name] = s.operator.np_fn(*(cols[i] for i in s.inputs))
        out = pd.DataFrame({c: cols[c] for c in self.output_columns}, index=pdf.index)
        if self.label_col is not None and self.label_col in pdf.columns:
            out[self.label_col] = pdf[self.label_col]
        return out

    def apply_spark(self, df: DataFrame) -> DataFrame:
        """Ψ(df) as a single chain of Column expressions (no shuffles)."""
        exprs: dict[str, F.col] = {}

        def col_of(name: str):
            return exprs.get(name, F.col(name))

        for s in self.needed_specs():
            exprs[s.name] = s.operator.spark_fn(
                *(col_of(i) for i in s.inputs)
            ).alias(s.name)
        select = [col_of(c).alias(c) for c in self.output_columns]
        if self.label_col is not None and self.label_col in df.columns:
            select.append(F.col(self.label_col))
        return df.select(*select)

    # -- serialisation -----------------------------------------------------
    def to_json(self) -> str:
        return json.dumps(
            {
                "specs": [{"op": s.op, "inputs": list(s.inputs)} for s in self.specs],
                "output_columns": self.output_columns,
                "label_col": self.label_col,
            }
        )

    @classmethod
    def from_json(cls, payload: str) -> "FeaturePlan":
        d = json.loads(payload)
        return cls(
            [FeatureSpec(s["op"], tuple(s["inputs"])) for s in d["specs"]],
            d["output_columns"],
            d["label_col"],
        )

    @classmethod
    def identity(cls, columns: list[str], label_col: str | None = None) -> "FeaturePlan":
        """The ORIG baseline: no generation, keep every original column."""
        return cls([], [c for c in columns if c != label_col], label_col)
