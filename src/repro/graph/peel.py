"""(α,β)-core computation by cascading peel (Definition 1).

Each round aggregates per-side degrees and semi-joins the edge list with the
vertices that still meet their threshold; the fixpoint (no edge removed) is
the (α,β)-core. This is the bulk-synchronous analogue of the sequential
bucket peel the paper uses inside ``Q_o`` and the SCS feasibility checks.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.schema import checkpoint, degrees


class PeelDidNotConverge(RuntimeError):
    """Raised when the cascade exceeds ``max_iter`` rounds (a bug guard —
    every peel terminates in at most |V| rounds)."""


def abcore(
    edges: DataFrame, alpha: int, beta: int, *, max_iter: int = 500
) -> DataFrame:
    """The (α,β)-core of ``edges`` as a (checkpointed) edge DataFrame.

    Returns an empty DataFrame with the same schema when the core is empty.
    """
    if alpha <= 1 and beta <= 1:
        # Every incident edge trivially satisfies (1,1); nothing to peel.
        return checkpoint(edges)
    cur = checkpoint(edges)
    n = cur.count()
    for _ in range(max_iter):
        if n == 0:
            return cur
        du, dv = degrees(cur)
        good_u = du.where(F.col("deg") >= alpha).select("u")
        good_v = dv.where(F.col("deg") >= beta).select("v")
        nxt = checkpoint(
            cur.join(good_u, "u", "semi").join(good_v, "v", "semi")
        )
        n2 = nxt.count()
        if n2 == n:
            return nxt
        cur, n = nxt, n2
    raise PeelDidNotConverge(f"abcore({alpha},{beta}) after {max_iter} rounds")
