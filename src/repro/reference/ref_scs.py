"""Sequential significant-(α,β)-community search (test oracle).

``scs_peel`` is a literal transcription of the paper's Algorithm 4
(SCS-Peel). ``scs_threshold`` independently computes the same answer through
the weight-threshold identity that the distributed implementation relies on:

    after SCS-Peel has consumed every weight < w, the surviving graph is
    exactly the (α,β)-core of the subgraph with edge weights ≥ w, hence
    f(R) = max{w : q ∈ core(C_{≥w})} and R is q's component in that core.

Tests assert the two agree on every input, which validates the identity the
Spark algorithms are built on.
"""
from __future__ import annotations

from .ref_graph import Edge, abcore, community, component_of


def _has_vertex(edges: list[Edge], q: int, qside: str) -> bool:
    idx = 0 if qside == "u" else 1
    return any(e[idx] == q for e in edges)


def significance(edges: list[Edge]) -> float:
    """Graph weight f(G): the minimum edge weight (Definition 4)."""
    return min(w for _, _, w in edges)


def scs_peel(
    edges: list[Edge], q: int, qside: str, alpha: int, beta: int
) -> list[Edge]:
    """Algorithm 4 (SCS-Peel), literally: batch-remove minimum-weight edges,
    cascade the degree constraint, stop when q falls out, restore the last
    surviving graph and return q's component in it."""
    cur = community(edges, q, qside, alpha, beta)
    if not cur:
        return []
    if len({w for _, _, w in cur}) == 1:
        return cur
    while cur:
        wmin = min(w for _, _, w in cur)
        prev = cur
        nxt = abcore([e for e in cur if e[2] > wmin], alpha, beta)
        if not _has_vertex(nxt, q, qside):
            # prev is the graph at the start of the fatal iteration: an
            # (α,β)-core containing q. R is q's component inside it.
            return component_of(prev, q, qside)
        cur = nxt
    raise AssertionError("q survived the full peel — unreachable")


def scs_threshold(
    edges: list[Edge], q: int, qside: str, alpha: int, beta: int
) -> list[Edge]:
    """Independent oracle via the weight-threshold identity (see module doc)."""
    c = community(edges, q, qside, alpha, beta)
    if not c:
        return []
    best: list[Edge] = []
    for w in sorted({w for _, _, w in c}):
        core = abcore([e for e in c if e[2] >= w], alpha, beta)
        if _has_vertex(core, q, qside):
            best = component_of(core, q, qside)
        else:
            break
    return best
