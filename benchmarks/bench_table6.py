"""Benchmark backing Table VI: the JSD stability computation (T=5 on
`magic`). Regenerate the full table with ``python jobs/table6_stability.py``."""
import numpy as np
import pytest

from repro.experiments.datasets import BENCHMARK_DATASETS, make_dataset
from repro.experiments.stability import feature_stability

MAGIC = [s for s in BENCHMARK_DATASETS if s.name == "magic"][0]


@pytest.mark.parametrize("method", ["RAND", "SAFE"])
def test_bench_table6_stability(benchmark, method):
    train, _va, _te = make_dataset(MAGIC)
    j = benchmark.pedantic(
        feature_stability,
        args=(method, train),
        kwargs={"T": 5},
        rounds=1,
        iterations=1,
        warmup_rounds=0,
    )
    assert 0 <= j <= np.log(2) + 1e-9
