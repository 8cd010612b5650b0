"""Community statistics (Table II columns) unit tests."""
import math

import pytest

from repro.graph.schema import edges_df
from repro.models.stats import community_stats, vertex_set


@pytest.fixture(scope="module")
def comm(spark):
    return edges_df(
        spark,
        [(1, 1, 4.0), (1, 2, 5.0), (2, 1, 3.0), (2, 2, 4.0)],
    )


def test_counts(comm):
    s = community_stats(comm)
    assert (s.n_u, s.n_m) == (2, 2)


def test_rating_stats(comm):
    s = community_stats(comm)
    assert s.r_avg == pytest.approx(4.0)
    assert s.r_min == 3.0


def test_m_avg_is_edges_per_user(comm):
    assert community_stats(comm).m_avg == pytest.approx(2.0)


def test_vertex_set(comm):
    assert vertex_set(comm) == {("u", 1), ("u", 2), ("v", 1), ("v", 2)}


def test_sim_identity(comm):
    ref = vertex_set(comm)
    assert community_stats(comm, reference=ref).sim == 1.0


def test_sim_partial_overlap(comm):
    ref = {("u", 1), ("u", 2), ("v", 1), ("v", 9)}
    s = community_stats(comm, reference=ref)
    assert s.sim == pytest.approx(3 / 5)


def test_sim_disjoint(comm):
    ref = {("u", 7), ("v", 7)}
    assert community_stats(comm, reference=ref).sim == 0.0


def test_empty_community(spark):
    empty = spark.createDataFrame([], "u long, v long, w double")
    s = community_stats(empty, reference={("u", 1)})
    assert s.n_u == 0 and s.sim == 0.0 and math.isnan(s.r_avg)
