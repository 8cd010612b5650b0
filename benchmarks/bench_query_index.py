"""Benchmark — Fig 8/10/11-shaped: (α,β)-community retrieval algorithms
(Q_o / Q_v / Q_opt) and index construction (I_v / I_δ / I_bs^α / I_bs^β)
on the GH-like dataset at α = β = 0.7δ.
"""
import pytest

from repro import datasets
from repro.core.index_bicore import build_iv
from repro.core.index_bs import build_ibs_alpha, build_ibs_beta
from repro.core.index_delta import build_idelta
from repro.core.query import q_bicore, q_online, q_opt
from repro.experiments import table3
from repro.graph.decomposition import coreness, delta
from repro.graph.schema import checkpoint


@pytest.fixture(scope="module")
def setup(spark):
    edges = checkpoint(datasets.load(spark, "GH"))
    d = delta(edges, coreness_df=coreness(edges))
    a = b = max(2, round(0.7 * d))
    iv = checkpoint(build_iv(edges, delta_val=d))
    idelta = checkpoint(build_idelta(edges, delta_val=d))
    q = table3.pick_queries(idelta, a, b, n=1)[0]
    return edges, d, a, b, iv, idelta, q


class TestIndexConstruction:
    def test_build_iv(self, benchmark, setup):
        edges, d, *_ = setup
        idx = benchmark.pedantic(
            lambda: build_iv(edges, delta_val=d).count(), rounds=1, iterations=1
        )
        assert idx > 0

    def test_build_idelta(self, benchmark, setup):
        edges, d, *_ = setup
        idx = benchmark.pedantic(
            lambda: build_idelta(edges, delta_val=d).count(), rounds=1, iterations=1
        )
        assert idx > 0

    def test_build_ibs_alpha(self, benchmark, setup):
        edges, *_ = setup
        idx = benchmark.pedantic(
            lambda: build_ibs_alpha(edges).count(), rounds=1, iterations=1
        )
        assert idx > 0

    def test_build_ibs_beta(self, benchmark, setup):
        edges, *_ = setup
        idx = benchmark.pedantic(
            lambda: build_ibs_beta(edges).count(), rounds=1, iterations=1
        )
        assert idx > 0


class TestQueryAlgorithms:
    def test_q_online(self, benchmark, setup):
        edges, d, a, b, iv, idelta, q = setup
        n = benchmark.pedantic(
            lambda: q_online(edges, q, "u", a, b).count(), rounds=1, iterations=1
        )
        assert n > 0

    def test_q_bicore(self, benchmark, setup):
        edges, d, a, b, iv, idelta, q = setup
        n = benchmark.pedantic(
            lambda: q_bicore(iv, edges, q, "u", a, b).count(),
            rounds=1, iterations=1,
        )
        assert n > 0

    def test_q_opt(self, benchmark, setup):
        edges, d, a, b, iv, idelta, q = setup
        n = benchmark.pedantic(
            lambda: q_opt(idelta, q, "u", a, b).count(), rounds=1, iterations=1
        )
        assert n > 0

    def test_all_agree(self, setup):
        """The three retrieval paths return the identical community."""
        edges, d, a, b, iv, idelta, q = setup
        s1 = {(r.u, r.v) for r in q_online(edges, q, "u", a, b).collect()}
        s2 = {(r.u, r.v) for r in q_bicore(iv, edges, q, "u", a, b).collect()}
        s3 = {(r.u, r.v) for r in q_opt(idelta, q, "u", a, b).collect()}
        assert s1 == s2 == s3 and len(s1) > 0
