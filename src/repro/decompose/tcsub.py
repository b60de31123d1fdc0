"""Algorithm 5: enumerate all TC-subqueries of a query.

A TC-subquery is witnessed by a *timing sequence* — a ``≺``-chain whose
prefixes stay weakly connected (Defs 7/8). The BFS explores sequences,
memoised on the state ``(edge set, last edge)`` (the only thing that
determines legal extensions), so the state space is bounded by
``2^|E(Q)| · |E(Q)|`` rather than all permutations. A ``max_states`` cap
keeps adversarially dense timing orders tractable; when hit, the
enumeration is truncated (every single edge is always present, so the
greedy cover in :mod:`.greedy` still succeeds and simply may pick
slightly shorter chains — noted in DESIGN.md).
"""
from __future__ import annotations

from collections import deque

from ..core.query import QueryGraph


def tcsub(
    query: QueryGraph, max_states: int = 200_000
) -> dict[frozenset[int], list[int]]:
    """All TC-subqueries, as {edge set: one representative timing sequence}.

    Mirrors Algorithm 5: seed the queue with every single edge; extend a
    sequence by any edge ``ε_x`` adjacent to the current subgraph with
    ``ε_last ≺ ε_x``.
    """
    out: dict[frozenset[int], list[int]] = {}
    queue: deque[tuple[tuple[int, ...], int]] = deque()
    seen: set[tuple[frozenset[int], int]] = set()
    for e in range(query.n_edges):
        state = (frozenset({e}), e)
        seen.add(state)
        queue.append(((e,), e))
        out[frozenset({e})] = [e]
    states = query.n_edges
    while queue:
        seq, last = queue.popleft()
        used = frozenset(seq)
        verts = query.edge_vertices(seq)
        for nxt in range(query.n_edges):
            if nxt in used or not query.precedes(last, nxt):
                continue
            if not (query.edges[nxt].vertices & verts):
                continue
            nused = used | {nxt}
            state = (nused, nxt)
            if state in seen:
                continue
            seen.add(state)
            states += 1
            nseq = seq + (nxt,)
            out.setdefault(nused, list(nseq))
            if states < max_states:
                queue.append((nseq, nxt))
    return out
