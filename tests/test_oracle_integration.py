"""Integration: derive a customer-part purchase bipartite graph from the
provided TPC-H-lite tables with DataFrame joins, verify the derivation with
the DuckDB oracle, then run the paper's pipeline end to end on it."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.core.query import q_online
from repro.core.scs import scs_peel
from repro.graph.schema import normalize
from repro.oracle import assert_equivalent
from repro.reference import ref_graph as R
from repro.reference import ref_scs as RS
from tests.util import eset, eset_df


@pytest.fixture(scope="module")
def tpch(spark):
    li = sd.lineitem(spark, sf=0.002, seed=3)
    o = sd.orders(spark, sf=0.002, seed=4)
    return li, o


@pytest.fixture(scope="module")
def purchase_graph(spark, tpch):
    """customer--part edges; weight = total quantity purchased."""
    li, o = tpch
    g = (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
        .groupBy(
            F.col("o_custkey").alias("u"), F.col("l_partkey").alias("v")
        )
        .agg(F.sum("l_quantity").alias("w"))
    )
    return normalize(g).cache()


def test_purchase_graph_matches_oracle(spark, tpch, purchase_graph):
    li, o = tpch
    sql = """
        SELECT o_custkey AS u, l_partkey AS v, sum(l_quantity) AS w
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY 1, 2
    """
    assert_equivalent(purchase_graph, sql, lineitem=li, orders=o)


def test_degrees_match_oracle(spark, tpch, purchase_graph):
    li, o = tpch
    du = purchase_graph.groupBy("u").agg(F.count(F.lit(1)).alias("deg"))
    sql = """
        WITH g AS (
            SELECT DISTINCT o_custkey AS u, l_partkey AS v
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        )
        SELECT u, count(*) AS deg FROM g GROUP BY u
    """
    assert_equivalent(
        du.select("u", F.col("deg").cast("long").alias("deg")), sql,
        lineitem=li, orders=o,
    )


def test_pipeline_on_purchase_graph(purchase_graph):
    """Community + SCS on the TPC-H-derived graph vs the reference."""
    edges = [
        (int(r.u), int(r.v), float(r.w)) for r in purchase_graph.collect()
    ]
    alpha = beta = 2
    core = R.abcore(edges, alpha, beta)
    if not core:
        pytest.skip("purchase graph too sparse at this SF")
    q = core[0][0]
    community = q_online(purchase_graph, q, "u", alpha, beta)
    assert eset_df(community) == eset(R.community(edges, q, "u", alpha, beta))
    got = eset_df(scs_peel(community, q, "u", alpha, beta))
    assert got == eset(RS.scs_peel(edges, q, "u", alpha, beta))
