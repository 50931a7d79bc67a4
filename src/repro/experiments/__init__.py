"""Evaluation harnesses reproducing the paper's tables."""
from .datasets import (
    BENCHMARK_DATASETS,
    BUSINESS_DATASETS,
    LABEL_COL,
    DatasetSpec,
    dataset_info_rows,
    make_dataset,
)
from .runner import METHODS, evaluate_plan, fit_method, run_dataset
from .stability import feature_stability, jsd
from .timing import time_methods, timing_table

__all__ = [
    "BENCHMARK_DATASETS",
    "BUSINESS_DATASETS",
    "LABEL_COL",
    "DatasetSpec",
    "dataset_info_rows",
    "make_dataset",
    "METHODS",
    "evaluate_plan",
    "fit_method",
    "run_dataset",
    "feature_stability",
    "jsd",
    "time_methods",
    "timing_table",
]
