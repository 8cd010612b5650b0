"""Degeneracy-bounded index ``I_δ`` (paper Section III-B, Alg. 3).

Two parts, each with slices τ in [1, δ]:

* side ``a`` (for queries with α <= β, i.e. min(α,β) = α = τ): edges of the
  (τ,τ)-core whose endpoints both have α-offset ``s_a(·,τ) >= τ``;
* side ``b`` (for queries with β < α, τ = β): edges whose endpoints both
  have β-offset ``s_b(·,τ) > τ`` (strict, mirroring the paper's bound — a
  query on this side always filters ``>= α > τ``).

Rows are ``(side, tau, u, v, w, off_u, off_v)``. Since every non-empty
(α,β)-core has min(α,β) <= δ (Lemma 4), these 2δ slices cover every
(α,β)-community; each slice is O(size(R_ττ)) so the index is O(δ·m)
(Lemma 5), built from two δ-slice offset fixpoints (Lemma 6's O(δ·m) bound).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.decomposition import alpha_offsets, beta_offsets, coreness, delta


def build_idelta(edges: DataFrame, *, delta_val: int | None = None) -> DataFrame:
    """Construct ``I_δ`` as a single DataFrame (see module doc for schema)."""
    d = delta_val if delta_val is not None else delta(edges, coreness_df=coreness(edges))
    spark = edges.sparkSession
    schema = "side string, tau int, u long, v long, w double, off_u int, off_v int"
    if d == 0:
        return spark.createDataFrame([], schema)
    taus = range(1, d + 1)

    sa = alpha_offsets(edges, taus)
    side_a = (
        _annotate(edges, sa, "alpha")
        .where((F.col("off_u") >= F.col("alpha")) & (F.col("off_v") >= F.col("alpha")))
        .select(
            F.lit("a").alias("side"), F.col("alpha").alias("tau"),
            "u", "v", "w", "off_u", "off_v",
        )
    )
    sb = beta_offsets(edges, taus)
    side_b = (
        _annotate(edges, sb, "beta")
        .where((F.col("off_u") > F.col("beta")) & (F.col("off_v") > F.col("beta")))
        .select(
            F.lit("b").alias("side"), F.col("beta").alias("tau"),
            "u", "v", "w", "off_u", "off_v",
        )
    )
    return side_a.unionByName(side_b)


def _annotate(edges: DataFrame, offs: DataFrame, slice_col: str) -> DataFrame:
    off_u = offs.where(F.col("side") == "u").select(
        slice_col, F.col("id").alias("u"), F.col("off").alias("off_u")
    )
    off_v = offs.where(F.col("side") == "v").select(
        slice_col, F.col("id").alias("v"), F.col("off").alias("off_v")
    )
    return (
        edges.join(off_u, "u")
        .join(off_v, [slice_col, "v"])
        .select(slice_col, "u", "v", "w", "off_u", "off_v")
    )
