"""Benchmark — Table I generators.

One benchmark per representative dataset: the full Table I row computation
(load + coreness fixpoint + δ + α_max/β_max + |R_δδ|). The complete
11-dataset table is produced by ``jobs/table1_datasets.py``; EXPERIMENTS.md
records both.
"""
import pytest

from repro.experiments import table1

# One small, one hub-heavy, one dense dataset — the three Table I regimes.
DATASETS = ["BS", "DT", "ML"]


@pytest.mark.parametrize("name", DATASETS)
def test_table1_dataset_row(benchmark, spark, name):
    row = benchmark.pedantic(
        lambda: table1.dataset_row(spark, name), rounds=1, iterations=1
    )
    assert row["E"] > 0 and row["delta"] >= 1
    assert row["R_dd"] <= row["E"]
