"""Tests of the basic indexes I_bs^α / I_bs^β and Parquet persistence."""
import pytest
from pyspark.sql import functions as F

from repro.core.index_bs import (
    build_ibs_alpha,
    build_ibs_beta,
    index_disk_bytes,
    load_index,
    save_index,
)
from repro.reference import ref_graph as R
from tests.util import eset


@pytest.fixture(scope="module")
def fig2_ibs_alpha(fig2_df):
    return build_ibs_alpha(fig2_df).cache()


class TestIbsAlpha:
    def test_alpha_range(self, fig2_ibs_alpha, fig2_edges):
        alphas = {r.alpha for r in fig2_ibs_alpha.select("alpha").distinct().collect()}
        assert alphas == set(range(1, R.alpha_max(fig2_edges) + 1))

    def test_offsets_positive(self, fig2_ibs_alpha):
        assert fig2_ibs_alpha.where(
            (F.col("off_u") < 1) | (F.col("off_v") < 1)
        ).count() == 0

    @pytest.mark.parametrize("alpha,beta", [(1, 1), (2, 2), (3, 3), (4, 1)])
    def test_slice_filter_gives_core(self, fig2_ibs_alpha, fig2_edges, alpha, beta):
        got = {
            (r.u, r.v)
            for r in fig2_ibs_alpha.where(
                (F.col("alpha") == alpha)
                & (F.col("off_u") >= beta) & (F.col("off_v") >= beta)
            ).collect()
        }
        assert got == eset(R.abcore(fig2_edges, alpha, beta))

    def test_size_grows_with_alpha_max(self, rand_dfs, rand_edges):
        """The paper's point: I_bs^α stores a slice per α, so hub-heavy
        upper layers multiply the size."""
        idx = build_ibs_alpha(rand_dfs[1])
        m = len(rand_edges[1])
        assert idx.count() > m  # several slices of the (·,1)-cores

    def test_max_alpha_cap(self, fig2_df):
        idx = build_ibs_alpha(fig2_df, max_alpha=2)
        alphas = {r.alpha for r in idx.select("alpha").distinct().collect()}
        assert alphas == {1, 2}


class TestIbsBeta:
    @pytest.mark.parametrize("alpha,beta", [(1, 1), (2, 2), (1, 4)])
    def test_slice_filter_gives_core(self, fig2_df, fig2_edges, alpha, beta):
        idx = build_ibs_beta(fig2_df)
        got = {
            (r.u, r.v)
            for r in idx.where(
                (F.col("beta") == beta)
                & (F.col("off_u") >= alpha) & (F.col("off_v") >= alpha)
            ).collect()
        }
        assert got == eset(R.abcore(fig2_edges, alpha, beta))


class TestPersistence:
    def test_roundtrip_partitioned(self, spark, fig2_ibs_alpha, tmp_path):
        path = str(tmp_path / "ibs_alpha")
        save_index(fig2_ibs_alpha, path, ["alpha"])
        back = load_index(spark, path)
        orig = {
            (r.alpha, r.u, r.v, r.off_u, r.off_v)
            for r in fig2_ibs_alpha.collect()
        }
        readback = {
            (r.alpha, r.u, r.v, r.off_u, r.off_v) for r in back.collect()
        }
        assert readback == orig

    def test_partition_layout_on_disk(self, fig2_ibs_alpha, tmp_path):
        path = str(tmp_path / "ibs_alpha")
        save_index(fig2_ibs_alpha, path, ["alpha"])
        import os

        parts = [d for d in os.listdir(path) if d.startswith("alpha=")]
        assert len(parts) >= 2  # one directory per slice → partition pruning

    def test_disk_bytes_positive(self, fig2_ibs_alpha, tmp_path):
        path = str(tmp_path / "idx")
        save_index(fig2_ibs_alpha, path, ["alpha"])
        assert index_disk_bytes(path) > 0
