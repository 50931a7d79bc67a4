"""Benchmark backing Table VII: business-scale dataset generation (scaled
to 20k rows to bound benchmark time). Regenerate the table with
``python jobs/table7_business_datasets.py``."""
from dataclasses import replace

from repro.experiments.datasets import BUSINESS_DATASETS, LABEL_COL, make_dataset


def test_bench_table7_business_generation(benchmark):
    spec = replace(BUSINESS_DATASETS[0], n_train=20_000, n_valid=4_000, n_test=4_000)
    tr, _va, _te = benchmark(make_dataset, spec)
    assert 0.01 < tr[LABEL_COL].mean() < 0.06  # fraud-style imbalance
