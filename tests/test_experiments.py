"""Integration tests of the table harnesses (small-parameter runs)."""
import pytest
from pyspark.sql import functions as F

from repro.experiments import fig8, table1, table2, table3


class TestTable1:
    @pytest.fixture(scope="class")
    def row(self, spark):
        return table1.dataset_row(spark, "BS")

    def test_columns(self, row):
        for col in ("E", "U", "L", "delta", "alpha_max", "beta_max", "R_dd"):
            assert col in row and f"paper_{col}" in row

    def test_degeneracy_core_smaller_than_graph(self, row):
        """The paper's Table I shape: |R_δδ| ≪ |E| and δ ≪ sqrt(m)."""
        assert 0 < row["R_dd"] < row["E"]
        assert 1 <= row["delta"] <= row["E"] ** 0.5

    def test_alpha_max_is_hub_degree(self, row):
        assert row["alpha_max"] >= row["delta"]
        assert row["beta_max"] >= row["delta"]


class TestTable2:
    @pytest.fixture(scope="class")
    def result(self, spark):
        return table2.run(spark)

    def test_five_models(self, result):
        assert set(result["model"]) == {"SC", "ab-core", "bitruss", "biclique", "C4star"}

    def test_sc_is_its_own_reference(self, result):
        assert float(result.set_index("model").loc["SC", "Sim_pct"]) == 100.0

    def test_sc_highest_min_rating(self, result):
        t = result.set_index("model")
        assert t.loc["SC", "R_min"] >= t.loc["ab-core", "R_min"]
        assert t.loc["SC", "R_min"] >= 4.5  # the planted community rating

    def test_sc_smaller_than_core(self, result):
        t = result.set_index("model")
        assert t.loc["SC", "U"] <= t.loc["ab-core", "U"]

    def test_sc_higher_avg_than_structural_models(self, result):
        t = result.set_index("model")
        for other in ("ab-core", "bitruss"):
            if t.loc[other, "U"] > 0:
                assert t.loc["SC", "R_avg"] >= t.loc[other, "R_avg"]


class TestTable3Pieces:
    def test_weighted_variants_share_structure(self, spark):
        variants = table3.weighted_variants(spark, dataset="BS", levels=20)
        base = {(r.u, r.v) for r in variants["AE"].select("u", "v").collect()}
        for dist in ("RW", "UF", "SK"):
            got = {(r.u, r.v) for r in variants[dist].select("u", "v").collect()}
            assert got == base, dist

    def test_ae_single_weight(self, spark):
        variants = table3.weighted_variants(spark, dataset="BS", levels=20)
        assert variants["AE"].select("w").distinct().count() == 1

    def test_levels_bound_distinct_weights(self, spark):
        variants = table3.weighted_variants(spark, dataset="BS", levels=20)
        for dist in ("UF", "SK", "RW"):
            assert variants[dist].select("w").distinct().count() <= 21, dist

    def test_reweight_index_preserves_topology(self, spark):
        from repro.core.index_delta import build_idelta

        variants = table3.weighted_variants(spark, dataset="BS", levels=20)
        idx = build_idelta(variants["AE"])
        re = table3.reweight_index(idx, variants["UF"])
        assert re.count() == idx.count()
        joined = re.join(
            variants["UF"].withColumnRenamed("w", "w2"), ["u", "v"]
        )
        assert joined.where(F.col("w") != F.col("w2")).count() == 0

    def test_pick_queries_deterministic_and_in_core(self, spark):
        from repro.core.index_delta import build_idelta
        from repro.graph.peel import abcore
        from repro.graph.schema import has_vertex

        variants = table3.weighted_variants(spark, dataset="BS", levels=20)
        edges = variants["UF"]
        idx = build_idelta(edges)
        qs = table3.pick_queries(idx, 2, 2, n=3, seed=1)
        assert qs == table3.pick_queries(idx, 2, 2, n=3, seed=1)
        core = abcore(edges, 2, 2)
        for q in qs:
            assert has_vertex(core, q, "u")
