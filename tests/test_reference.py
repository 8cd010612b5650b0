"""Tests of the pure-Python reference implementations themselves.

The references are transcriptions of the paper's definitions; these tests
pin them to hand-verified facts on handcrafted graphs (including the
Figure 2-like example) and to each other (SCS-Peel vs the threshold
identity), so the Spark-vs-reference tests elsewhere rest on solid ground.
"""
import pytest

from repro.reference import ref_graph as R
from repro.reference import ref_scs as RS
from repro.reference.ref_bitruss import butterfly_count, butterfly_support, k_bitruss
from tests.util import eset, paper_figure2_like, rand_bipartite

FIG2 = paper_figure2_like()
SEEDS = [1, 2, 3, 4, 5]


class TestDegrees:
    def test_fig2_degrees(self):
        du, dv = R.degrees(FIG2)
        assert du == {1: 4, 2: 4, 3: 3, 4: 2}
        assert dv == {1: 4, 2: 4, 3: 3, 4: 2}

    def test_empty(self):
        assert R.degrees([]) == ({}, {})


class TestAbcore:
    def test_11_core_is_whole_graph(self):
        assert eset(R.abcore(FIG2, 1, 1)) == eset(FIG2)

    def test_22_core_keeps_everything(self):
        # v4 has degree 2 and u4 degree 2: nothing falls out at (2,2).
        assert eset(R.abcore(FIG2, 2, 2)) == eset(FIG2)

    def test_33_core_is_biclique(self):
        got = eset(R.abcore(FIG2, 3, 3))
        assert got == {(u, v) for u in (1, 2, 3) for v in (1, 2, 3)}

    def test_44_core_empty(self):
        assert R.abcore(FIG2, 4, 4) == []

    def test_cascade(self):
        # Path-like chain: peeling one endpoint cascades down the chain.
        chain = [(1, 1, 1.0), (2, 1, 1.0), (2, 2, 1.0), (3, 2, 1.0)]
        assert R.abcore(chain, 2, 2) == []

    def test_asymmetric_alpha_beta(self):
        # (1,4)-core: only v1 and v2 retain degree 4; all four u's survive.
        core = R.abcore(FIG2, 1, 4)
        assert eset(core) == {(u, v) for u in (1, 2, 3, 4) for v in (1, 2)}
        assert R.abcore(FIG2, 1, 5) == []

    @pytest.mark.parametrize("alpha,beta", [(1, 1), (2, 2), (3, 2), (2, 3)])
    def test_core_satisfies_degree_constraints(self, alpha, beta):
        for seed in SEEDS:
            core = R.abcore(rand_bipartite(seed), alpha, beta)
            du, dv = R.degrees(core)
            assert all(d >= alpha for d in du.values())
            assert all(d >= beta for d in dv.values())

    @pytest.mark.parametrize("seed", SEEDS)
    def test_hierarchy(self, seed):
        """Lemma 2: (α,β)-core ⊆ (α',β')-core when α >= α', β >= β'."""
        edges = rand_bipartite(seed)
        prev = eset(R.abcore(edges, 1, 1))
        for k in (2, 3):
            cur = eset(R.abcore(edges, k, k))
            assert cur <= prev
            prev = cur


class TestComponent:
    def test_whole_graph_connected(self):
        assert eset(R.component_of(FIG2, 3, "u")) == eset(FIG2)

    def test_isolated_query(self):
        assert R.component_of(FIG2, 99, "u") == []

    def test_two_components(self):
        edges = [(1, 1, 1.0), (2, 1, 1.0), (3, 2, 1.0), (4, 2, 1.0)]
        assert eset(R.component_of(edges, 1, "u")) == {(1, 1), (2, 1)}
        assert eset(R.component_of(edges, 2, "v")) == {(3, 2), (4, 2)}

    def test_lower_side_query(self):
        assert eset(R.component_of(FIG2, 4, "v")) == eset(FIG2)


class TestOffsets:
    def test_fig2_alpha_offsets(self):
        sa_u, sa_v = R.alpha_offsets(FIG2, 3)
        # (3,3)-core is the 3x3 biclique; u4 is in no (3,β)-core but v4
        # survives up to (3,2) (its neighbours u1, u2 keep degree >= 3).
        assert sa_u == {1: 3, 2: 3, 3: 3}
        assert sa_v == {1: 3, 2: 3, 3: 3, 4: 2}

    def test_fig2_alpha1(self):
        sa_u, sa_v = R.alpha_offsets(FIG2, 1)
        # Both u1 and v1 survive to the (1,4)-core and no further.
        assert sa_u[1] == 4 and sa_v[1] == 4

    def test_offset_defines_core_membership(self):
        """s_a(x,α) >= β  ⇔  x ∈ (α,β)-core — the index filter invariant."""
        for seed in SEEDS[:3]:
            edges = rand_bipartite(seed)
            for alpha in (1, 2, 3):
                sa_u, sa_v = R.alpha_offsets(edges, alpha)
                for beta in (1, 2, 3):
                    core = R.abcore(edges, alpha, beta)
                    in_u = {u for u, _, _ in core}
                    in_v = {v for _, v, _ in core}
                    assert in_u == {u for u, s in sa_u.items() if s >= beta}
                    assert in_v == {v for v, s in sa_v.items() if s >= beta}

    def test_beta_offsets_symmetric(self):
        """s_b on G equals s_a on the layer-swapped graph."""
        edges = rand_bipartite(7)
        swapped = [(v, u, w) for u, v, w in edges]
        for beta in (1, 2):
            sb_u, sb_v = R.beta_offsets(edges, beta)
            sa_u, sa_v = R.alpha_offsets(swapped, beta)
            assert sb_u == sa_v and sb_v == sa_u


class TestCoreness:
    def test_fig2_delta(self):
        assert R.delta(FIG2) == 3

    def test_fig2_coreness_values(self):
        c = R.coreness(FIG2)
        assert c[("u", 1)] == 3 and c[("u", 4)] == 2 and c[("v", 4)] == 2

    @pytest.mark.parametrize("seed", SEEDS)
    def test_coreness_vs_tau_tau_cores(self, seed):
        edges = rand_bipartite(seed)
        c = R.coreness(edges)
        for tau in range(1, R.delta(edges) + 1):
            core = R.abcore(edges, tau, tau)
            members = {("u", u) for u, _, _ in core} | {("v", v) for _, v, _ in core}
            assert members == {x for x, k in c.items() if k >= tau}

    def test_alpha_beta_max(self):
        assert R.alpha_max(FIG2) == 4  # deg(u1) = deg(u2) = 4
        assert R.beta_max(FIG2) == 4  # deg(v1) = deg(v2) = 4

    def test_delta_bounded_by_sqrt_m(self):
        for seed in SEEDS:
            edges = rand_bipartite(seed)
            assert R.delta(edges) <= len(edges) ** 0.5


class TestRefScs:
    def test_fig2_significant_community(self):
        """The paper's Example 1 analogue: R = {u3,u4} x {v1,v2} at w=5."""
        r = RS.scs_peel(FIG2, 3, "u", 2, 2)
        assert eset(r) == {(3, 1), (3, 2), (4, 1), (4, 2)}
        assert RS.significance(r) == 5.0

    def test_fig2_unique_max_significance(self):
        r = RS.scs_peel(FIG2, 1, "u", 2, 2)
        # u1 has no w=5 edges forming a core: best threshold is 3.
        assert RS.significance(r) == 3.0

    def test_equal_weights_returns_community(self):
        edges = [(u, v, 2.0) for u, v, _ in FIG2]
        r = RS.scs_peel(edges, 3, "u", 2, 2)
        assert eset(r) == eset(R.community(edges, 3, "u", 2, 2))

    def test_empty_when_not_in_core(self):
        assert RS.scs_peel(FIG2, 4, "u", 3, 3) == []

    @pytest.mark.parametrize("seed", SEEDS)
    @pytest.mark.parametrize("alpha,beta", [(2, 2), (2, 3), (3, 2)])
    def test_peel_equals_threshold_identity(self, seed, alpha, beta):
        """The identity the distributed algorithms rely on (DESIGN.md §2)."""
        edges = rand_bipartite(seed)
        core = R.abcore(edges, alpha, beta)
        if not core:
            pytest.skip("empty core")
        q = core[0][0]
        got = sorted(eset(RS.scs_peel(edges, q, "u", alpha, beta)))
        exp = sorted(eset(RS.scs_threshold(edges, q, "u", alpha, beta)))
        assert got == exp

    @pytest.mark.parametrize("seed", SEEDS)
    def test_result_satisfies_model_constraints(self, seed):
        """Definition 5: connectivity, cohesiveness, maximality."""
        edges = rand_bipartite(seed)
        alpha = beta = 2
        core = R.abcore(edges, alpha, beta)
        if not core:
            pytest.skip("empty core")
        q = core[0][0]
        r = RS.scs_peel(edges, q, "u", alpha, beta)
        if not r:
            pytest.skip("no community")
        # cohesiveness
        du, dv = R.degrees(r)
        assert all(d >= alpha for d in du.values())
        assert all(d >= beta for d in dv.values())
        # connectivity containing q
        assert eset(R.component_of(r, q, "u")) == eset(r)
        # maximality: no feasible subgraph of C with higher significance
        c = R.community(edges, q, "u", alpha, beta)
        w_star = RS.significance(r)
        for w in sorted({x for _, _, x in c}):
            if w > w_star:
                higher = R.abcore([e for e in c if e[2] >= w], alpha, beta)
                assert not any(u == q for u, _, _ in higher)


class TestRefBitruss:
    def test_single_butterfly(self):
        bf = [(1, 1, 1.0), (1, 2, 1.0), (2, 1, 1.0), (2, 2, 1.0)]
        assert butterfly_count(bf) == 1
        assert all(s == 1 for s in butterfly_support(bf).values())

    def test_biclique_counts(self):
        # Complete 3x3 biclique: C(3,2)^2 = 9 butterflies; each edge is in
        # (3-1)*(3-1) = 4 of them.
        b33 = [(u, v, 1.0) for u in (1, 2, 3) for v in (1, 2, 3)]
        assert butterfly_count(b33) == 9
        assert all(s == 4 for s in butterfly_support(b33).values())

    def test_no_butterfly(self):
        star = [(1, v, 1.0) for v in range(5)]
        assert butterfly_count(star) == 0

    def test_k_bitruss_peels(self):
        b33 = [(u, v, 1.0) for u in (1, 2, 3) for v in (1, 2, 3)]
        extra = b33 + [(9, 1, 1.0), (9, 9, 1.0)]
        assert eset(k_bitruss(extra, 4)) == eset(b33)
        assert k_bitruss(extra, 5) == []
