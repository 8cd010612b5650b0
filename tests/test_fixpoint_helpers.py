"""Property tests of the h-index / k-th-largest column expressions that the
decomposition fixpoints are built on — checked against numpy on many random
arrays in a single Spark job."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graph.decomposition import _hindex, _kth_largest


def _hindex_np(vals):
    arr = sorted(vals, reverse=True)
    return sum(1 for i, x in enumerate(arr) if x >= i + 1)


def _kth_np(vals, k):
    arr = sorted(vals, reverse=True)
    return arr[k - 1] if k <= len(arr) else 0


@pytest.fixture(scope="module")
def cases(spark):
    rng = np.random.default_rng(17)
    rows = []
    for i in range(200):
        n = int(rng.integers(1, 12))
        vals = [int(x) for x in rng.integers(0, 10, n)]
        k = int(rng.integers(1, 14))
        rows.append((i, vals, k))
    df = spark.createDataFrame(rows, "i int, vals array<int>, k int")
    out = df.select(
        "i", "vals", "k",
        _hindex(F.col("vals")).alias("h"),
        _kth_largest(F.col("vals"), F.col("k")).alias("kth"),
    ).collect()
    return out


def test_hindex_matches_numpy(cases):
    for r in cases:
        assert r["h"] == _hindex_np(r["vals"]), (r["vals"], r["h"])


def test_kth_largest_matches_numpy(cases):
    for r in cases:
        assert r["kth"] == _kth_np(r["vals"], r["k"]), (r["vals"], r["k"], r["kth"])


def test_hindex_known_values(spark):
    df = spark.createDataFrame(
        [(1, [3, 3, 3]), (2, [1, 1, 1, 1]), (3, [5]), (4, [0, 0])],
        "i int, vals array<int>",
    )
    got = {r["i"]: r["h"] for r in df.select("i", _hindex(F.col("vals")).alias("h")).collect()}
    assert got == {1: 3, 2: 1, 3: 1, 4: 0}


def test_kth_out_of_bounds_is_zero(spark):
    df = spark.createDataFrame([(1, [7, 5], 3)], "i int, vals array<int>, k int")
    row = df.select(_kth_largest(F.col("vals"), F.col("k")).alias("kth")).first()
    assert row["kth"] == 0
