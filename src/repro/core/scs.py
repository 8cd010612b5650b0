"""Significant (α,β)-community search: SCS-Peel, SCS-Expand, SCS-Baseline.

All three compute the unique ``R`` of Definition 5. The dataflow
formulation rests on the weight-threshold identity (validated against the
literal sequential Algorithm 4 in tests):

    once SCS-Peel has consumed every weight < w, the surviving graph is
    exactly ``abcore(C_{>=w}, α, β)``; therefore
    ``f(R) = w* = max{ w ∈ W : q ∈ abcore(C_{>=w}) }`` (W = distinct
    weights of C_αβ(q)) and ``R`` is q's BFS component in that core.

A literal per-distinct-weight loop is not expressible efficiently as a
bulk-synchronous dataflow (one barrier per distinct weight), so each
algorithm walks the threshold ladder the way its sequential counterpart
walks the edge ranking — preserving each algorithm's cost anchor
(DESIGN.md §2):

* ``scs_peel``    — ascending gallop from w_min: probes 1, 2, 4, … steps up
  the ladder, then binary-refines. Early probes peel nearly all of
  ``C_αβ(q)``, so cost is anchored to size(C) — like the sequential peel.
* ``scs_expand``  — descending with the paper's ε=2 growth rule: candidate
  thresholds are chosen so the prefix edge count roughly doubles; each
  candidate builds the connected component ``C*`` of q, applies the
  Lemma 7 / Lemma 8 pre-checks (plus a free edge-count bound from the
  weight histogram, so early rungs cost zero Spark jobs), and only then
  peels. Cost is anchored to size(R).
* ``scs_baseline`` — the same expansion but over q's component of the WHOLE
  graph, no step-1 community: cost anchored to size(G).

Equal-weight short-circuit (paper Section IV): if every edge weight in the
search space is identical, the community itself is returned unchanged.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.components import component_of
from repro.graph.peel import abcore
from repro.graph.schema import checkpoint, degrees, has_vertex


@dataclass(frozen=True)
class _Params:
    q: int
    qside: str
    alpha: int
    beta: int


def _distinct_weight_hist(c: DataFrame) -> list[tuple[float, int]]:
    """Ascending ``(weight, edge_count)`` histogram of the search space."""
    rows = c.groupBy("w").agg(F.count(F.lit(1)).alias("n")).collect()
    return sorted((float(r["w"]), int(r["n"])) for r in rows)


def _feasible_core(c: DataFrame, p: _Params, w: float) -> DataFrame | None:
    """``abcore(C_{>=w})`` if q survives in it, else None."""
    core = abcore(c.where(F.col("w") >= w), p.alpha, p.beta)
    return core if has_vertex(core, p.q, p.qside) else None


def _binary_refine(
    c: DataFrame,
    p: _Params,
    ws: list[float],
    lo: int,
    lo_core: DataFrame,
    hi: int,
) -> DataFrame:
    """Max-feasible search: ws[lo] feasible (with its core), ws[hi]
    infeasible (hi == len(ws) acts as +inf). Returns the core at w*."""
    while hi - lo > 1:
        mid = (lo + hi) // 2
        core = _feasible_core(c, p, ws[mid])
        if core is not None:
            lo, lo_core = mid, core
        else:
            hi = mid
    return lo_core


def scs_peel(
    community: DataFrame, q: int, qside: str, alpha: int, beta: int
) -> DataFrame:
    """SCS-Peel (paper Alg. 4) given ``C_αβ(q)`` (e.g. from ``q_opt``)."""
    p = _Params(q, qside, alpha, beta)
    hist = _distinct_weight_hist(community)
    if len(hist) <= 1:
        return community  # empty, or all weights equal: C is already R
    ws = [w for w, _ in hist]
    c = checkpoint(community)
    # ws[0] is always feasible: C itself is an (α,β)-core containing q.
    lo, lo_core, hi, step = 0, c, len(ws), 1
    while lo + step < len(ws):
        j = lo + step
        core = _feasible_core(c, p, ws[j])
        if core is None:
            hi = j
            break
        lo, lo_core, step = j, core, step * 2
    core = _binary_refine(c, p, ws, lo, lo_core, hi)
    return component_of(core, q, qside)


def _lemma7_ok(m: int, n_u: int, n_l: int, alpha: int, beta: int) -> bool:
    """Lemma 7: R ⊆ C* requires αβ - α - β <= |E(C*)| - |U(C*)| - |L(C*)|."""
    return alpha * beta - alpha - beta <= m - n_u - n_l


def _lemma8_ok(cstar: DataFrame, p: _Params) -> bool:
    """Lemma 8: C* must contain >= β U-vertices of degree >= α and >= α
    L-vertices of degree >= β, with q among the qualifying vertices.
    Evaluated in a single aggregation over both degree tables."""
    du, dv = degrees(cstar)
    verts = du.select(
        F.lit("u").alias("s"), F.col("u").alias("id"), "deg"
    ).unionByName(dv.select(F.lit("v").alias("s"), F.col("v").alias("id"), "deg"))
    one = F.lit(1)
    row = verts.agg(
        F.sum(F.when((F.col("s") == "u") & (F.col("deg") >= p.alpha), one)).alias("gu"),
        F.sum(F.when((F.col("s") == "v") & (F.col("deg") >= p.beta), one)).alias("gv"),
        F.max(
            F.when((F.col("s") == p.qside) & (F.col("id") == p.q), F.col("deg"))
        ).alias("qdeg"),
    ).first()
    q_min = p.alpha if p.qside == "u" else p.beta
    return (
        (row["gu"] or 0) >= p.beta
        and (row["gv"] or 0) >= p.alpha
        and row["qdeg"] is not None
        and row["qdeg"] >= q_min
    )


def _expand_ladder(hist: list[tuple[float, int]], eps: float) -> list[int]:
    """Indices (into the ascending weight array) of the descending candidate
    thresholds: prefix edge count grows by >= ε between consecutive rungs,
    and the bottom rung (index 0 — the full graph) is always included."""
    ladder: list[int] = []
    cum, target = 0, 1
    for i in range(len(hist) - 1, -1, -1):
        cum += hist[i][1]
        if cum >= target:
            ladder.append(i)
            target = max(cum * eps, target * eps)
    if not ladder or ladder[-1] != 0:
        ladder.append(0)
    return ladder


def _expand_search(
    c: DataFrame, p: _Params, *, eps: float, require_exists: bool
) -> DataFrame:
    """Shared descending-expansion engine over search space ``c``.

    ``require_exists=False`` (baseline) allows the case where no feasible
    threshold exists at all (q not in any (α,β)-core of its component);
    the community-based callers know the bottom rung is feasible.
    """
    spark = c.sparkSession
    hist = _distinct_weight_hist(c)
    ws = [w for w, _ in hist]
    if not hist:
        return c
    if len(hist) == 1:
        core = abcore(c, p.alpha, p.beta)
        return component_of(core, p.q, p.qside)
    c = checkpoint(c)
    # Free pruning bound: q's maximum incident weight (one tiny job) — rungs
    # above it cannot contain q at all.
    qcol = "u" if p.qside == "u" else "v"
    row = c.where(F.col(qcol) == p.q).agg(F.max("w")).first()
    q_wmax = float(row[0]) if row and row[0] is not None else -math.inf
    # Minimum edges any C* hosting R must have (from Lemma 7's proof).
    min_edges = max(
        p.alpha * p.beta - p.alpha - p.beta + 2, max(p.alpha, p.beta), 1
    )

    # Every pruning rule below except the ε-growth skip is a *necessary*
    # condition for feasibility at its threshold (if q were in the core of
    # the prefix, its core component K ⊆ C* would satisfy the edge-count
    # bound, incidence, and Lemmas 7/8), so each such skip lowers the
    # known-infeasible bound `hi` — keeping the final binary-refine bracket
    # tight without extra Spark work.
    lo, lo_core, hi = None, None, len(ws)
    prev_checked = 0
    cum = 0
    cums: dict[int, int] = {}
    for i in range(len(hist) - 1, -1, -1):
        cum += hist[i][1]
        cums[i] = cum
    for i in _expand_ladder(hist, eps):
        w = ws[i]
        if w > q_wmax or cums[i] < min_edges:  # free bounds, no Spark work
            hi = i
            continue
        prefix = c.where(F.col("w") >= w)
        cstar = checkpoint(component_of(prefix, p.q, p.qside))
        row = cstar.agg(
            F.count(F.lit(1)).alias("m"),
            F.countDistinct("u").alias("n_u"),
            F.countDistinct("v").alias("n_l"),
        ).first()
        m, n_u, n_l = int(row["m"]), int(row["n_u"]), int(row["n_l"])
        if m == 0 or not _lemma7_ok(m, n_u, n_l, p.alpha, p.beta):
            hi = i
            continue
        if i != 0 and prev_checked > 0 and m < prev_checked * eps:
            continue  # ε-growth rule: unknown feasibility — hi must not move
        if not _lemma8_ok(cstar, p):
            hi = i
            continue
        prev_checked = m
        core = abcore(cstar, p.alpha, p.beta)
        if has_vertex(core, p.q, p.qside):
            lo, lo_core = i, core
            break
        hi = i
    if lo is None:
        if require_exists:
            raise AssertionError("community search space had no feasible threshold")
        return spark.createDataFrame([], c.schema)
    core = _binary_refine(c, p, ws, lo, lo_core, hi)
    return component_of(core, p.q, p.qside)


def scs_expand(
    community: DataFrame,
    q: int,
    qside: str,
    alpha: int,
    beta: int,
    *,
    eps: float = 2.0,
) -> DataFrame:
    """SCS-Expand (paper Alg. 5) given ``C_αβ(q)``."""
    p = _Params(q, qside, alpha, beta)
    return _expand_search(community, p, eps=eps, require_exists=True)


def scs_baseline(
    edges: DataFrame,
    q: int,
    qside: str,
    alpha: int,
    beta: int,
    *,
    eps: float = 2.0,
) -> DataFrame:
    """SCS-Baseline: expansion from q's component of the WHOLE graph —
    no index, no step-1 restriction (the paper's baseline)."""
    p = _Params(q, qside, alpha, beta)
    comp = component_of(edges, q, qside)
    return _expand_search(comp, p, eps=eps, require_exists=False)
