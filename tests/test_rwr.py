"""Random-walk-with-restart weight substrate: stochastic invariants and a
numpy power-iteration cross-check."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graph.schema import edges_df
from repro.weights.rwr import rwr_scores, rwr_weights
from tests.util import rand_bipartite

EDGES = rand_bipartite(31, n_u=8, n_l=6, m=30)


@pytest.fixture(scope="module")
def df(spark):
    return edges_df(spark, EDGES)


def _numpy_scores(edges, damping=0.85, iters=12):
    verts = sorted({("u", u) for u, _, _ in edges} | {("v", v) for _, v, _ in edges})
    idx = {x: i for i, x in enumerate(verts)}
    n = len(verts)
    deg = np.zeros(n)
    pairs = []
    for u, v, _ in edges:
        a, b = idx[("u", u)], idx[("v", v)]
        deg[a] += 1
        deg[b] += 1
        pairs.append((a, b))
    s = np.full(n, 1.0 / n)
    for _ in range(iters):
        inflow = np.zeros(n)
        for a, b in pairs:
            inflow[b] += s[a] / deg[a]
            inflow[a] += s[b] / deg[b]
        s = (1 - damping) / n + damping * inflow
    return {x: s[i] for x, i in idx.items()}


def test_scores_match_numpy(df):
    got = {(r.side, r.id): r.score for r in rwr_scores(df).collect()}
    exp = _numpy_scores(EDGES)
    assert got.keys() == exp.keys()
    for k in exp:
        assert got[k] == pytest.approx(exp[k], rel=1e-9)


def test_scores_sum_to_one(df):
    total = rwr_scores(df).agg(F.sum("score")).first()[0]
    assert total == pytest.approx(1.0, rel=1e-6)


def test_scores_positive(df):
    assert rwr_scores(df).where(F.col("score") <= 0).count() == 0


def test_hub_scores_higher(spark):
    star = [(1, v, 1.0) for v in range(6)] + [(2, 0, 1.0)]
    s = {(r.side, r.id): r.score for r in rwr_scores(edges_df(spark, star)).collect()}
    assert s[("u", 1)] > s[("u", 2)]


def test_weights_in_unit_range(df):
    w = rwr_weights(df)
    lo, hi = w.agg(F.min("w"), F.max("w")).first()
    assert 0 < lo <= hi <= 1.0


def test_weights_cover_all_edges(df):
    assert rwr_weights(df).count() == len(EDGES)


def test_weights_deterministic(df):
    a = {(r.u, r.v): r.w for r in rwr_weights(df).collect()}
    b = {(r.u, r.v): r.w for r in rwr_weights(df).collect()}
    assert a == b


def test_single_edge_graph(spark):
    one = edges_df(spark, [(1, 1, 1.0)])
    rows = rwr_weights(one).collect()
    assert len(rows) == 1 and rows[0].w == 1.0
