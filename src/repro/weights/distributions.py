"""Deterministic edge-weight assigners for the Table III distributions.

All functions take a pandas edge list with ``u``/``v`` columns and return a
copy with a ``w`` column; they are numpy-seeded so the Spark input and the
sequential reference oracles see identical weights.

* ``all_equal`` — AE: every weight identical (the short-circuit case).
* ``uniform``   — UF: iid uniform (0, 1], optionally quantized.
* ``skew_normal`` — SK: Azzalini skew-normal via the δ-representation
  ``X = δ|Z1| + sqrt(1-δ²)·Z2``. The paper quotes skewness 1.02, which is
  above the skew-normal family's supremum (~0.995); shape a=5 (skewness
  ≈ 0.85) is the closest attainable and is documented in DESIGN.md.
* ``ratings``   — half-star ratings 0.5..5.0 skewed toward 3.5-4.5, for the
  MovieLens-style case study.

``quantize`` bounds the number of distinct weights, which bounds the SCS
threshold-ladder length (DESIGN.md §2).
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def quantize(w: np.ndarray, levels: int) -> np.ndarray:
    """Snap weights to ``levels`` evenly spaced values over their range."""
    lo, hi = float(np.min(w)), float(np.max(w))
    if hi == lo:
        return w.copy()
    idx = np.round((w - lo) / (hi - lo) * (levels - 1))
    return lo + idx * (hi - lo) / (levels - 1)


def all_equal(pdf: pd.DataFrame, *, value: float = 1.0) -> pd.DataFrame:
    out = pdf.copy()
    out["w"] = float(value)
    return out


def uniform(
    pdf: pd.DataFrame, *, seed: int = 0, levels: int | None = None
) -> pd.DataFrame:
    g = _rng(seed)
    w = g.random(len(pdf)) + 1e-9
    out = pdf.copy()
    out["w"] = quantize(w, levels) if levels else w
    return out


def skew_normal(
    pdf: pd.DataFrame, *, seed: int = 0, a: float = 5.0, levels: int | None = None
) -> pd.DataFrame:
    g = _rng(seed)
    d = a / np.sqrt(1.0 + a * a)
    z1, z2 = g.standard_normal(len(pdf)), g.standard_normal(len(pdf))
    w = d * np.abs(z1) + np.sqrt(1.0 - d * d) * z2
    w = w - w.min() + 1e-6  # strictly positive weights
    out = pdf.copy()
    out["w"] = quantize(w, levels) if levels else w
    return out


_RATING_VALUES = np.arange(1, 11) / 2.0  # 0.5 .. 5.0 half-stars
_RATING_PROBS = np.array([2, 2, 3, 4, 6, 9, 14, 22, 23, 15], dtype="float64")
_RATING_PROBS /= _RATING_PROBS.sum()


def ratings(
    pdf: pd.DataFrame,
    *,
    seed: int = 0,
    high_mask: np.ndarray | None = None,
    high_min: float = 4.5,
) -> pd.DataFrame:
    """Half-star ratings; rows selected by ``high_mask`` are forced to
    ``high_min``..5.0 (used to rate the planted community highly)."""
    g = _rng(seed)
    w = g.choice(_RATING_VALUES, size=len(pdf), p=_RATING_PROBS)
    if high_mask is not None:
        high_vals = _RATING_VALUES[_RATING_VALUES >= high_min]
        w = np.where(high_mask, g.choice(high_vals, size=len(pdf)), w)
    out = pdf.copy()
    out["w"] = w
    return out
