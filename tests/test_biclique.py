"""Greedy maximal-biclique-containing-q heuristic: exactness on planted
bicliques, maximality, and containment invariants."""
import pytest

from repro.graph.schema import edges_df
from repro.models.biclique import biclique_edges, maximal_biclique
from tests.util import rand_bipartite


def _is_biclique(edges, us, vs):
    have = {(u, v) for u, v, _ in edges}
    return all((u, v) in have for u in us for v in vs)


def test_planted_biclique_recovered(spark):
    plant = [(u, v, 1.0) for u in range(4) for v in range(4)]
    noise = [(7, 0, 1.0), (8, 1, 1.0), (0, 9, 1.0)]
    df = edges_df(spark, plant + noise)
    us, vs = maximal_biclique(df, 0, "u", min_side=3)
    assert set(us) == {0, 1, 2, 3} and set(vs) == {0, 1, 2, 3}


def test_contains_query_vertex(spark):
    edges = rand_bipartite(4, n_u=10, n_l=10, m=60)
    df = edges_df(spark, edges)
    q = edges[0][0]
    us, vs = maximal_biclique(df, q, "u", min_side=1)
    assert q in us
    assert _is_biclique(edges, us, vs)


def test_result_is_biclique_and_maximal(spark):
    edges = rand_bipartite(6, n_u=8, n_l=8, m=45)
    df = edges_df(spark, edges)
    q = edges[0][0]
    us, vs = maximal_biclique(df, q, "u", min_side=1)
    assert _is_biclique(edges, us, vs)
    # U-maximality: no other u is adjacent to every v in vs.
    from collections import defaultdict

    adj = defaultdict(set)
    for u, v, _ in edges:
        adj[u].add(v)
    for u in adj:
        if u not in us:
            assert not set(vs) <= adj[u]


def test_lower_side_query(spark):
    plant = [(u, v, 1.0) for u in range(3) for v in range(3)]
    df = edges_df(spark, plant + [(9, 9, 1.0)])
    us, vs = maximal_biclique(df, 0, "v", min_side=2)
    assert 0 in vs and set(us) == {0, 1, 2}


def test_isolated_query(spark):
    df = edges_df(spark, [(1, 1, 1.0)])
    assert maximal_biclique(df, 5, "u", min_side=1) == ([], [])


def test_min_side_unreachable_still_returns_q_star(spark):
    star = [(1, v, 1.0) for v in range(3)]
    df = edges_df(spark, star)
    us, vs = maximal_biclique(df, 1, "u", min_side=10)
    assert us == [1] and set(vs) == {0, 1, 2}


def test_biclique_edges_materialisation(spark):
    plant = [(u, v, float(u + v)) for u in range(3) for v in range(3)]
    df = edges_df(spark, plant)
    out = biclique_edges(df, [0, 1], [0, 2])
    got = {(r.u, r.v) for r in out.collect()}
    assert got == {(0, 0), (0, 2), (1, 0), (1, 2)}


def test_biclique_edges_empty_lists(spark):
    df = edges_df(spark, [(1, 1, 1.0)])
    assert biclique_edges(df, [], []).count() == 0
