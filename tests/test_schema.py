"""Tests of the edge-list schema helpers, with DuckDB-oracle checks for the
SQL-expressible pieces (degrees, dedup normalization)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph import schema as S
from repro.oracle import assert_equivalent
from tests.util import rand_bipartite


@pytest.fixture(scope="module")
def df(spark):
    return S.edges_df(spark, rand_bipartite(21))


@pytest.fixture(scope="module")
def pdf():
    return pd.DataFrame(rand_bipartite(21), columns=["u", "v", "w"])


class TestEdgesDf:
    def test_schema(self, df):
        assert [f.name for f in df.schema.fields] == ["u", "v", "w"]
        assert df.schema["u"].dataType.simpleString() == "bigint"
        assert df.schema["w"].dataType.simpleString() == "double"

    def test_row_count(self, df):
        assert df.count() == len(rand_bipartite(21))


class TestNormalize:
    def test_dedup_keeps_max_weight(self, spark):
        raw = spark.createDataFrame(
            [(1, 1, 2.0), (1, 1, 5.0), (2, 1, 1.0)], "u long, v long, w double"
        )
        rows = {(r.u, r.v): r.w for r in S.normalize(raw).collect()}
        assert rows == {(1, 1): 5.0, (2, 1): 1.0}

    def test_oracle_dedup(self, spark, pdf):
        dup = pd.concat([pdf, pdf.head(10)], ignore_index=True)
        got = S.normalize(spark.createDataFrame(dup))
        assert_equivalent(
            got,
            "SELECT u, v, max(w) AS w FROM edges GROUP BY u, v",
            edges=dup,
        )

    def test_casts(self, spark):
        raw = spark.createDataFrame([(1, 2, 3)], "u int, v int, w int")
        out = S.normalize(raw)
        assert out.schema["w"].dataType.simpleString() == "double"


class TestDegrees:
    def test_oracle_u_degrees(self, df, pdf):
        du, _ = S.degrees(df)
        assert_equivalent(
            du.select("u", F.col("deg").cast("long").alias("deg")),
            "SELECT u, count(*) AS deg FROM edges GROUP BY u",
            edges=pdf,
        )

    def test_oracle_v_degrees(self, df, pdf):
        _, dv = S.degrees(df)
        assert_equivalent(
            dv.select("v", F.col("deg").cast("long").alias("deg")),
            "SELECT v, count(*) AS deg FROM edges GROUP BY v",
            edges=pdf,
        )


class TestStatsAndLookup:
    def test_graph_stats(self, df, pdf):
        s = S.graph_stats(df)
        assert s == {
            "m": len(pdf),
            "n_u": pdf["u"].nunique(),
            "n_l": pdf["v"].nunique(),
        }

    def test_has_vertex(self, df, pdf):
        assert S.has_vertex(df, int(pdf["u"].iloc[0]), "u")
        assert S.has_vertex(df, int(pdf["v"].iloc[0]), "v")
        assert not S.has_vertex(df, 10_000, "u")

    def test_checkpoint_preserves_rows(self, df):
        assert S.checkpoint(df).count() == df.count()
