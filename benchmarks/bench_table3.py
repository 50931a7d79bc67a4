"""Benchmark backing Table III: one full method×classifier cell sweep on
the `magic` dataset (the mid-sized benchmark). Regenerate the full table
with ``python jobs/table3_benchmark_auc.py``."""
import pytest

from repro.experiments.datasets import BENCHMARK_DATASETS
from repro.experiments.runner import run_dataset

MAGIC = [s for s in BENCHMARK_DATASETS if s.name == "magic"][0]


@pytest.mark.parametrize("method", ["ORIG", "SAFE", "TFC"])
def test_bench_table3_method_sweep(benchmark, method):
    """Fit + evaluate one method on magic with a 3-classifier panel."""

    def run():
        return run_dataset(
            MAGIC, methods=(method,), classifiers=("LR", "kNN", "XGB")
        )

    result = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    aucs = result.set_index("clf")["auc"]
    assert (aucs > 0.55).all()
