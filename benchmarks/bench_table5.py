"""Benchmark backing Table V: per-method fit wall-clock on `spambase`
(dim 30 — large enough that TFC's O(N·M²) generation shows). Regenerate
the full table with ``python jobs/table5_execution_time.py``."""
import pytest

from repro.experiments.datasets import BENCHMARK_DATASETS, LABEL_COL, make_dataset
from repro.experiments.runner import fit_method

SPAM = [s for s in BENCHMARK_DATASETS if s.name == "spambase"][0]


@pytest.fixture(scope="module")
def spam_train():
    train, valid, _test = make_dataset(SPAM)
    return train, valid


@pytest.mark.parametrize("method", ["FCT", "TFC", "RAND", "IMP", "SAFE"])
def test_bench_table5_fit_time(benchmark, spam_train, method):
    train, valid = spam_train
    res = benchmark.pedantic(
        fit_method,
        args=(method, train, LABEL_COL, valid),
        rounds=1,
        iterations=1,
        warmup_rounds=0,
    )
    assert res.plan.output_columns
