"""Benchmark backing Table VIII: SAFE's distributed-engine fit on a scaled
business dataset (20k rows through the full Spark path: approxQuantile
binning, mapInPandas histograms, distributed IV/Pearson/gain-ratio).
Regenerate the full table with ``python jobs/table8_business_auc.py``."""
from dataclasses import replace

import pandas as pd

from repro.core.pipeline import SafePipeline
from repro.experiments.datasets import BUSINESS_DATASETS, LABEL_COL, make_dataset

GBDT = {"n_estimators": 5, "max_depth": 3}


def test_bench_table8_safe_distributed_fit(benchmark, spark):
    spec = replace(BUSINESS_DATASETS[0], n_train=16_000, n_valid=4_000, n_test=1_000)
    train, valid, _test = make_dataset(spec)
    sdf = spark.createDataFrame(pd.concat([train, valid], ignore_index=True)).cache()
    sdf.count()

    def run():
        return SafePipeline(mining_gbdt=GBDT, ranking_gbdt=GBDT).fit(
            sdf, LABEL_COL, engine="spark"
        )

    plan = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    sdf.unpersist()
    assert plan.output_columns
    assert plan.generated_outputs()
