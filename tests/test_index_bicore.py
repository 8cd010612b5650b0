"""Tests of the bicore-index baseline I_v (vertex offsets only)."""
import pytest

from repro.core.index_bicore import build_iv, core_vertices
from repro.core.index_delta import build_idelta
from repro.reference import ref_graph as R


@pytest.fixture(scope="module")
def fig2_iv(fig2_df):
    return build_iv(fig2_df).cache()


class TestCoreVertices:
    @pytest.mark.parametrize("alpha,beta", [(1, 1), (2, 2), (3, 3), (2, 3), (3, 2)])
    def test_matches_reference_vertex_sets(self, fig2_iv, fig2_edges, alpha, beta):
        got = {(r.side, r.id) for r in core_vertices(fig2_iv, alpha, beta).collect()}
        core = R.abcore(fig2_edges, alpha, beta)
        exp = {("u", u) for u, _, _ in core} | {("v", v) for _, v, _ in core}
        assert got == exp

    @pytest.mark.parametrize("seed", [1, 2])
    def test_random_graphs(self, rand_edges, rand_dfs, seed):
        iv = build_iv(rand_dfs[seed]).cache()
        d = R.delta(rand_edges[seed])
        for alpha, beta in [(1, 2), (2, 2), (2, 1), (d, d), (d + 1, d)]:
            got = {(r.side, r.id) for r in core_vertices(iv, alpha, beta).collect()}
            core = R.abcore(rand_edges[seed], alpha, beta)
            exp = {("u", u) for u, _, _ in core} | {("v", v) for _, v, _ in core}
            assert got == exp, (alpha, beta)

    def test_above_delta_empty(self, fig2_iv, fig2_edges):
        d = R.delta(fig2_edges)
        assert core_vertices(fig2_iv, d + 1, d + 1).count() == 0


class TestSize:
    def test_vertex_only_index_smaller_than_idelta(self, rand_dfs, rand_edges):
        """Fig 11's shape: I_v (vertices) is smaller than I_δ (edges)."""
        iv = build_iv(rand_dfs[1])
        idelta = build_idelta(rand_dfs[1])
        assert iv.count() < idelta.count()

    def test_empty_graph(self, spark):
        empty = spark.createDataFrame([], "u long, v long, w double")
        assert build_iv(empty).count() == 0
