"""Edge-list schema helpers.

The canonical bipartite edge list is a DataFrame ``(u: long, v: long,
w: double)``; ``u`` ids live in the upper layer's namespace, ``v`` ids in the
lower layer's. A vertex is addressed by ``(side, id)`` with side ``"u"`` or
``"v"`` wherever both layers must share a namespace.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

EDGE_COLS = ("u", "v", "w")

EDGE_SCHEMA = T.StructType(
    [
        T.StructField("u", T.LongType(), False),
        T.StructField("v", T.LongType(), False),
        T.StructField("w", T.DoubleType(), False),
    ]
)


def edges_df(
    spark: SparkSession,
    edges: list[tuple[int, int, float]],
    *,
    num_partitions: int = 4,
) -> DataFrame:
    """Build a canonical edge DataFrame from in-memory ``(u, v, w)`` tuples."""
    rows = [(int(u), int(v), float(w)) for u, v, w in edges]
    return spark.createDataFrame(rows, EDGE_SCHEMA).repartition(num_partitions)


def normalize(df: DataFrame) -> DataFrame:
    """Project/cast to the canonical schema and collapse duplicate (u, v)
    pairs, keeping the maximum weight (bipartite graphs here are simple)."""
    out = df.select(
        F.col("u").cast("long").alias("u"),
        F.col("v").cast("long").alias("v"),
        F.col("w").cast("double").alias("w"),
    )
    return out.groupBy("u", "v").agg(F.max("w").alias("w"))


def degrees(edges: DataFrame) -> tuple[DataFrame, DataFrame]:
    """Per-side degree tables ``(deg_u(u, deg), deg_v(v, deg))``."""
    du = edges.groupBy("u").agg(F.count(F.lit(1)).alias("deg"))
    dv = edges.groupBy("v").agg(F.count(F.lit(1)).alias("deg"))
    return du, dv


def graph_stats(edges: DataFrame) -> dict[str, int]:
    """``{m, n_u, n_l}`` of the edge list in one aggregation."""
    row = edges.agg(
        F.count(F.lit(1)).alias("m"),
        F.countDistinct("u").alias("n_u"),
        F.countDistinct("v").alias("n_l"),
    ).first()
    return {"m": row["m"], "n_u": row["n_u"], "n_l": row["n_l"]}


def has_vertex(edges: DataFrame, q: int, qside: str) -> bool:
    """True if the query vertex is incident to at least one edge."""
    col = "u" if qside == "u" else "v"
    return edges.where(F.col(col) == q).limit(1).count() > 0


def checkpoint(df: DataFrame) -> DataFrame:
    """Eagerly materialise a DataFrame and truncate its lineage.

    Iterative algorithms call this once per round: without it, the logical
    plan grows linearly in the round count and Catalyst analysis time
    dominates the actual work.
    """
    return df.localCheckpoint(eager=True)
