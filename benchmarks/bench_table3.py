"""Benchmark — Table III: SCS algorithms under the four weight
distributions on the DT-like dataset (one seeded query per cell; the
multi-query averaged table is produced by
``jobs/table3_weight_distributions.py``).
"""
import pytest

from repro.core.index_delta import build_idelta
from repro.core.query import q_opt
from repro.core.scs import scs_baseline, scs_expand, scs_peel
from repro.experiments import table3
from repro.graph.decomposition import coreness, delta
from repro.graph.schema import checkpoint


@pytest.fixture(scope="module")
def setup(spark):
    variants = table3.weighted_variants(spark, dataset="DT")
    structure = variants["AE"]
    d = delta(structure, coreness_df=coreness(structure))
    a = b = max(2, round(0.7 * d))
    idelta = checkpoint(build_idelta(structure, delta_val=d))
    q = table3.pick_queries(idelta, a, b, n=1)[0]
    indexes = {
        dist: table3.reweight_index(idelta, variants[dist])
        for dist in table3.DISTRIBUTIONS
    }
    return variants, indexes, q, a, b


@pytest.mark.parametrize("dist", table3.DISTRIBUTIONS)
def test_scs_peel(benchmark, setup, dist):
    variants, indexes, q, a, b = setup
    n = benchmark.pedantic(
        lambda: scs_peel(q_opt(indexes[dist], q, "u", a, b), q, "u", a, b).count(),
        rounds=1, iterations=1,
    )
    assert n > 0


@pytest.mark.parametrize("dist", table3.DISTRIBUTIONS)
def test_scs_expand(benchmark, setup, dist):
    variants, indexes, q, a, b = setup
    n = benchmark.pedantic(
        lambda: scs_expand(q_opt(indexes[dist], q, "u", a, b), q, "u", a, b).count(),
        rounds=1, iterations=1,
    )
    assert n > 0


@pytest.mark.parametrize("dist", table3.DISTRIBUTIONS)
def test_scs_baseline(benchmark, setup, dist):
    variants, indexes, q, a, b = setup
    n = benchmark.pedantic(
        lambda: scs_baseline(variants[dist], q, "u", a, b).count(),
        rounds=1, iterations=1,
    )
    assert n > 0
