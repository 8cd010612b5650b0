"""Benchmark — Table II community models.

One benchmark per community model on the case-study graph (the work behind
each Table II row). The assembled table with statistics is produced by
``jobs/table2_case_study.py``.
"""
import pytest

from repro import datasets
from repro.core.query import q_online
from repro.core.scs import scs_peel
from repro.models.biclique import maximal_biclique
from repro.models.bitruss import bitruss_community
from repro.models.rating import c4star_community

Q, ALPHA, BETA = 0, 8, 8


@pytest.fixture(scope="module")
def graph(spark):
    return datasets.ml_comedy_like(spark).cache()


@pytest.fixture(scope="module")
def core_community(graph):
    return q_online(graph, Q, "u", ALPHA, BETA).cache()


def test_model_sc(benchmark, graph, core_community):
    r = benchmark.pedantic(
        lambda: scs_peel(core_community, Q, "u", ALPHA, BETA).count(),
        rounds=1, iterations=1,
    )
    assert r > 0


def test_model_abcore(benchmark, graph):
    r = benchmark.pedantic(
        lambda: q_online(graph, Q, "u", ALPHA, BETA).count(),
        rounds=1, iterations=1,
    )
    assert r > 0


def test_model_bitruss(benchmark, graph):
    r = benchmark.pedantic(
        lambda: bitruss_community(graph, Q, "u", k=ALPHA * BETA).count(),
        rounds=1, iterations=1,
    )
    assert r >= 0


def test_model_biclique(benchmark, graph):
    us, vs = benchmark.pedantic(
        lambda: maximal_biclique(graph, Q, "u", min_side=ALPHA),
        rounds=1, iterations=1,
    )
    assert Q in us


def test_model_c4star(benchmark, graph):
    r = benchmark.pedantic(
        lambda: c4star_community(graph, Q, "u").count(), rounds=1, iterations=1
    )
    assert r > 0
