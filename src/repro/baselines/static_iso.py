"""Static subgraph-isomorphism matching orders: QuickSI / TurboISO / BoostISO.

These drive the IncMat baseline (Fan et al.): each published system is
represented by its matching-order / filtering essence (DESIGN.md §3.7):

* ``quicksi``  — QI-sequence: prefix-connected, rarest term-label first.
* ``turboiso`` — candidate-region order: BFS from the query vertex with
  the rarest label (ties: highest degree), NLF-style degree filtering.
* ``boostiso`` — rarest-first order plus the degree-based candidate
  filtering (vertex-relationship pruning).

The actual matching is the shared relational pipeline in ``incmat.py``;
order + filtering are what differ, which is what differentiates the
systems at reproduction scale.
"""
from __future__ import annotations

from collections import Counter

import pandas as pd

from ..core.query import QueryGraph

STRATEGIES = ("quicksi", "turboiso", "boostiso")


def term_frequencies(stream: pd.DataFrame) -> Counter:
    """Frequency of (slabel, elabel, dlabel) terms in the data stream."""
    return Counter(zip(stream["slabel"], stream["elabel"], stream["dlabel"]))


def _edge_freq(query: QueryGraph, eid: int, freq: Counter) -> int:
    q = query.edges[eid]
    if q.elabel is not None:
        return freq[(query.vlabels[q.src], q.elabel, query.vlabels[q.dst])]
    return sum(
        v
        for (sl, _, dl), v in freq.items()
        if sl == query.vlabels[q.src] and dl == query.vlabels[q.dst]
    )


def _prefix_connected_greedy(
    query: QueryGraph, score, start: int | None = None
) -> list[int]:
    """Greedy prefix-connected order minimizing ``score`` at each step."""
    remaining = set(range(query.n_edges))
    if start is None:
        start = min(remaining, key=score)
    order = [start]
    remaining.discard(start)
    verts = set(query.edges[start].vertices)
    while remaining:
        legal = [e for e in remaining if query.edges[e].vertices & verts]
        nxt = min(legal, key=score)
        order.append(nxt)
        remaining.discard(nxt)
        verts |= query.edges[nxt].vertices
    return order


def matching_order(
    query: QueryGraph, strategy: str, freq: Counter
) -> list[int]:
    """Prefix-connected matching order per published strategy."""
    score = lambda e: (_edge_freq(query, e, freq), e)  # noqa: E731
    if strategy in ("quicksi", "boostiso"):
        return _prefix_connected_greedy(query, score)
    if strategy == "turboiso":
        # seed at the rarest-label, highest-degree query vertex
        vdeg = Counter()
        for q in query.edges:
            vdeg[q.src] += 1
            vdeg[q.dst] += 1
        label_freq = Counter()
        for (sl, _, dl), v in freq.items():
            label_freq[sl] += v
            label_freq[dl] += v
        seed_v = min(
            query.vertices,
            key=lambda u: (label_freq[query.vlabels[u]], -vdeg[u], u),
        )
        start = min(
            (e.eid for e in query.edges if seed_v in e.vertices), key=score
        )
        return _prefix_connected_greedy(query, score, start=start)
    raise ValueError(f"unknown strategy {strategy!r}")


def uses_degree_filter(strategy: str) -> bool:
    """TurboISO (NLF) and BoostISO (vertex relationships) prune candidates."""
    return strategy in ("turboiso", "boostiso")


def query_degrees(query: QueryGraph) -> dict[int, tuple[int, int]]:
    """(out-degree, in-degree) of every query vertex."""
    out: dict[int, tuple[int, int]] = {u: (0, 0) for u in query.vertices}
    for q in query.edges:
        o, i = out[q.src]
        out[q.src] = (o + 1, i)
        o, i = out[q.dst]
        out[q.dst] = (o, i + 1)
    return out
