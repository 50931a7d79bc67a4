"""Benchmark backing Table IV: benchmark-dataset generation throughput.
Regenerate the table with ``python jobs/table4_datasets.py``."""
import pytest

from repro.experiments.datasets import BENCHMARK_DATASETS, make_dataset


@pytest.mark.parametrize(
    "spec",
    [s for s in BENCHMARK_DATASETS if s.name in ("banknote", "gina", "vehicle")],
    ids=lambda s: s.name,
)
def test_bench_table4_dataset_generation(benchmark, spec):
    tr, _va, te = benchmark(make_dataset, spec)
    assert len(tr) == spec.n_train
    assert len(te) == spec.n_test
