"""Tests of the weight distribution assigners (Table III substrates)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.weights import distributions as wd

PDF = pd.DataFrame({"u": np.arange(500) % 20, "v": np.arange(500) % 17})


class TestAllEqual:
    def test_constant(self):
        out = wd.all_equal(PDF, value=2.5)
        assert (out["w"] == 2.5).all()

    def test_input_not_mutated(self):
        wd.all_equal(PDF)
        assert "w" not in PDF.columns


class TestUniform:
    def test_deterministic(self):
        a, b = wd.uniform(PDF, seed=4), wd.uniform(PDF, seed=4)
        pd.testing.assert_frame_equal(a, b)

    def test_range(self):
        w = wd.uniform(PDF, seed=4)["w"]
        assert (w > 0).all() and (w <= 1.0 + 1e-9).all()

    def test_levels_bound_distinct(self):
        w = wd.uniform(PDF, seed=4, levels=12)["w"]
        assert w.nunique() <= 12

    def test_roughly_uniform(self):
        w = wd.uniform(PDF, seed=4)["w"]
        assert 0.4 < w.mean() < 0.6


class TestSkewNormal:
    def test_deterministic(self):
        a, b = wd.skew_normal(PDF, seed=5), wd.skew_normal(PDF, seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_positive(self):
        assert (wd.skew_normal(PDF, seed=5)["w"] > 0).all()

    def test_skewed_right(self):
        w = wd.skew_normal(PDF, seed=5)["w"]
        skew = ((w - w.mean()) ** 3).mean() / w.std() ** 3
        assert skew > 0.3

    def test_levels(self):
        assert wd.skew_normal(PDF, seed=5, levels=8)["w"].nunique() <= 8


class TestRatings:
    def test_half_star_values(self):
        w = wd.ratings(PDF, seed=6)["w"]
        assert set(np.unique(w * 2)).issubset(set(range(1, 11)))

    def test_high_mask_forces_high(self):
        mask = np.zeros(len(PDF), dtype=bool)
        mask[:100] = True
        w = wd.ratings(PDF, seed=6, high_mask=mask, high_min=4.5)["w"]
        assert (w[:100] >= 4.5).all()

    def test_distribution_peaks_high(self):
        w = wd.ratings(PDF, seed=6)["w"]
        assert w.mean() > 3.0


class TestQuantize:
    @given(
        st.lists(
            st.floats(min_value=-100, max_value=100, allow_nan=False),
            min_size=1,
            max_size=50,
        ),
        st.integers(min_value=2, max_value=20),
    )
    @settings(max_examples=60, deadline=None)
    def test_bounds_and_distinct(self, vals, levels):
        w = np.array(vals)
        q = wd.quantize(w, levels)
        assert len(np.unique(q)) <= levels
        assert q.min() >= w.min() - 1e-9 and q.max() <= w.max() + 1e-9

    def test_constant_input(self):
        w = np.full(10, 3.3)
        assert (wd.quantize(w, 5) == 3.3).all()

    def test_preserves_order(self):
        w = np.array([0.1, 0.5, 0.9, 0.2])
        q = wd.quantize(w, 5)
        assert (np.argsort(q, kind="stable") == np.argsort(w, kind="stable")).all()
