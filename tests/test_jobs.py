"""Smoke tests of the spark-submit entrypoints: importable, with mains and
paper reference tables where applicable (full runs are exercised by the
benchmarks and the experiment integration tests)."""
import importlib.util
import pathlib

import pytest

JOBS = pathlib.Path(__file__).resolve().parents[1] / "jobs"


def _load(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.parametrize(
    "name",
    [
        "table1_datasets",
        "table2_case_study",
        "table3_weight_distributions",
        "fig8_query_index",
    ],
)
def test_job_importable_with_main(name):
    mod = _load(name)
    assert callable(mod.main)


def test_paper_tables_recorded():
    from repro.experiments import table2, table3

    assert list(table2.PAPER["model"]) == [
        "SC", "ab-core", "bitruss", "biclique", "C4star"
    ]
    assert list(table3.PAPER["algorithm"]) == [
        "SCS-Baseline", "SCS-Peel", "SCS-Expand"
    ]
    # The paper's headline shape is encoded in its own numbers: Peel/Expand
    # beat Baseline on every non-equal distribution.
    for dist in ("RW", "UF", "SK"):
        base = float(table3.PAPER.set_index("algorithm").loc["SCS-Baseline", dist])
        for alg in ("SCS-Peel", "SCS-Expand"):
            assert float(table3.PAPER.set_index("algorithm").loc[alg, dist]) < base
