"""C_4★ community: DuckDB-oracle check of the rating filter + component
semantics."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph.schema import edges_df
from repro.models.rating import c4star_community, high_rating_subgraph
from repro.oracle import assert_equivalent
from tests.util import eset_df, rand_bipartite

EDGES = rand_bipartite(12, n_u=10, n_l=8, m=50, wlevels=5)
PDF = pd.DataFrame(EDGES, columns=["u", "v", "w"])


@pytest.fixture(scope="module")
def df(spark):
    return edges_df(spark, EDGES)


def test_oracle_high_rating_filter(spark, df):
    got = high_rating_subgraph(df, threshold=4.0)
    sql = """
        SELECT e.u, e.v, e.w FROM edges e
        WHERE e.v IN (SELECT v FROM edges GROUP BY v HAVING avg(w) >= 4.0)
    """
    assert_equivalent(got, sql, edges=PDF)


@pytest.mark.parametrize("threshold", [1.0, 3.0, 5.0])
def test_oracle_thresholds(spark, df, threshold):
    got = high_rating_subgraph(df, threshold=threshold)
    sql = f"""
        SELECT e.u, e.v, e.w FROM edges e
        WHERE e.v IN (SELECT v FROM edges GROUP BY v HAVING avg(w) >= {threshold})
    """
    assert_equivalent(got, sql, edges=PDF)


def test_threshold_one_keeps_all(df):
    assert high_rating_subgraph(df, threshold=0.0).count() == len(EDGES)


def test_community_restricted_to_component(spark):
    edges = [(1, 1, 5.0), (2, 1, 5.0), (8, 9, 5.0)]
    df2 = edges_df(spark, edges)
    got = eset_df(c4star_community(df2, 1, "u", threshold=4.0))
    assert got == {(1, 1), (2, 1)}


def test_query_on_low_rated_movie_empty(spark):
    edges = [(1, 1, 1.0), (2, 1, 1.0)]
    df2 = edges_df(spark, edges)
    assert c4star_community(df2, 1, "u", threshold=4.0).count() == 0


def test_fig2_c4star(fig2_df):
    # avg ratings: v1 = (3+3+5+5)/4 = 4.0, v2 = 4.0, v3 = 3.0, v4 = 1.0.
    sub = high_rating_subgraph(fig2_df, threshold=4.0)
    vs = {r.v for r in sub.select("v").distinct().collect()}
    assert vs == {1, 2}
