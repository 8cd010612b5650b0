"""Sequential bipartite-graph primitives (test oracle).

A graph is a list of edges ``(u, v, w)`` where ``u`` lives in the upper-layer
id space, ``v`` in the lower-layer id space (the two spaces are disjoint by
position, so the same integer may appear on both sides). Vertices are
addressed as ``('u', id)`` / ``('v', id)`` where a single namespace is needed.

Everything here is a direct transcription of the paper's Definitions 1-7 via
naive iterative removal — O(m^2)-ish and only meant for graphs of up to a few
thousand edges inside tests.
"""
from __future__ import annotations

from collections import defaultdict

Edge = tuple[int, int, float]
Vertex = tuple[str, int]


def degrees(edges: list[Edge]) -> tuple[dict[int, int], dict[int, int]]:
    """Per-side degree maps ``(deg_u, deg_v)`` of the edge list."""
    du: dict[int, int] = defaultdict(int)
    dv: dict[int, int] = defaultdict(int)
    for u, v, _ in edges:
        du[u] += 1
        dv[v] += 1
    return dict(du), dict(dv)


def abcore(edges: list[Edge], alpha: int, beta: int) -> list[Edge]:
    """(α,β)-core of the edge list (Definition 1) by cascading removal."""
    cur = list(edges)
    while True:
        du, dv = degrees(cur)
        bad_u = {u for u, d in du.items() if d < alpha}
        bad_v = {v for v, d in dv.items() if d < beta}
        if not bad_u and not bad_v:
            return cur
        cur = [e for e in cur if e[0] not in bad_u and e[1] not in bad_v]


def component_of(edges: list[Edge], q: int, qside: str) -> list[Edge]:
    """Edges of the connected component containing ``(qside, q)``.

    Returns ``[]`` if ``q`` is not incident to any edge (an isolated query
    vertex has no community, matching Definition 3's requirement that the
    community contain q).
    """
    adj: dict[Vertex, list[tuple[Vertex, Edge]]] = defaultdict(list)
    for e in edges:
        un, vn = ("u", e[0]), ("v", e[1])
        adj[un].append((vn, e))
        adj[vn].append((un, e))
    start: Vertex = (qside, q)
    if start not in adj:
        return []
    seen = {start}
    out: list[Edge] = []
    out_set: set[Edge] = set()
    stack = [start]
    while stack:
        x = stack.pop()
        for y, e in adj[x]:
            if e not in out_set:
                out_set.add(e)
                out.append(e)
            if y not in seen:
                seen.add(y)
                stack.append(y)
    return out


def community(edges: list[Edge], q: int, qside: str, alpha: int, beta: int) -> list[Edge]:
    """``C_αβ(q)`` — the (α,β)-community of q (Definition 3)."""
    return component_of(abcore(edges, alpha, beta), q, qside)


def alpha_offsets(
    edges: list[Edge], alpha: int
) -> tuple[dict[int, int], dict[int, int]]:
    """``s_a(x, α)`` for every vertex (Definition 6), by repeated peeling.

    Returns per-side maps ``(sa_u, sa_v)``; vertices absent from the
    (α,1)-core get offset 0 (and are omitted from the maps — callers should
    use ``.get(x, 0)``).
    """
    sa_u: dict[int, int] = {}
    sa_v: dict[int, int] = {}
    beta = 1
    cur = abcore(edges, alpha, beta)
    while cur:
        for u, v, _ in cur:
            sa_u[u] = beta
            sa_v[v] = beta
        beta += 1
        cur = abcore(cur, alpha, beta)
    return sa_u, sa_v


def beta_offsets(
    edges: list[Edge], beta: int
) -> tuple[dict[int, int], dict[int, int]]:
    """``s_b(x, β)`` for every vertex — symmetric to :func:`alpha_offsets`."""
    sb_u: dict[int, int] = {}
    sb_v: dict[int, int] = {}
    alpha = 1
    cur = abcore(edges, alpha, beta)
    while cur:
        for u, v, _ in cur:
            sb_u[u] = alpha
            sb_v[v] = alpha
        alpha += 1
        cur = abcore(cur, alpha, beta)
    return sb_u, sb_v


def coreness(edges: list[Edge]) -> dict[Vertex, int]:
    """k-core number of every vertex of the graph viewed as unipartite.

    The (τ,τ)-core of a bipartite graph is exactly the k-core (k=τ) of the
    underlying graph, so ``max(coreness)`` is the paper's degeneracy δ and
    ``{x : coreness(x) ≥ τ}`` induces ``R_ττ``.
    """
    out: dict[Vertex, int] = {}
    k = 1
    cur = abcore(edges, k, k)
    while cur:
        for u, v, _ in cur:
            out[("u", u)] = k
            out[("v", v)] = k
        k += 1
        cur = abcore(cur, k, k)
    return out


def delta(edges: list[Edge]) -> int:
    """Degeneracy δ (Definition 7): largest τ with a non-empty (τ,τ)-core."""
    c = coreness(edges)
    return max(c.values(), default=0)


def alpha_max(edges: list[Edge]) -> int:
    """Largest α with a non-empty (α,1)-core — the max upper-layer degree."""
    du, _ = degrees(edges)
    return max(du.values(), default=0)


def beta_max(edges: list[Edge]) -> int:
    """Largest β with a non-empty (1,β)-core — the max lower-layer degree."""
    _, dv = degrees(edges)
    return max(dv.values(), default=0)
