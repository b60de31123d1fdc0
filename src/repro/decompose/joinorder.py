"""§VI-C join order: joint-number greedy over a decomposition (+ random).

The join order is a prefix-connected permutation of the TC-subqueries;
Def 12's *joint number* ``JN(Qⁱ,Qʲ) = n_v + n_t`` (shared vertices +
timing-related edge pairs) is the paper's selectivity proxy — more
shared constraints ⇒ smaller intermediate join results.
"""
from __future__ import annotations

import random
from typing import Sequence

from ..core.query import QueryGraph


def joint_number(
    query: QueryGraph, part_a: Sequence[int], part_b: Sequence[int]
) -> int:
    """Def 12: |V(Qᵃ) ∩ V(Qᵇ)| + #{(εᵢ,εⱼ) ∈ Qᵃ×Qᵇ with εᵢ≺εⱼ or εⱼ≺εᵢ}."""
    n_v = len(query.edge_vertices(part_a) & query.edge_vertices(part_b))
    n_t = sum(
        1
        for a in part_a
        for b in part_b
        if query.precedes(a, b) or query.precedes(b, a)
    )
    return n_v + n_t


def _connected(query: QueryGraph, verts: frozenset[int], part: Sequence[int]) -> bool:
    return bool(verts & query.edge_vertices(part))


def order_parts(
    query: QueryGraph,
    parts: list[list[int]],
    *,
    rng: random.Random | None = None,
    randomize: bool = False,
) -> list[list[int]]:
    """Prefix-connected permutation of ``parts``.

    Greedy (paper): seed with the connected pair of maximum joint number,
    then repeatedly append the connected part maximizing JN with the union
    so far. ``randomize=True`` gives Timing-RJ: a uniformly random
    prefix-connected permutation.
    """
    if len(parts) <= 1:
        return list(parts)
    rng = rng or random.Random(0)
    remaining = list(range(len(parts)))
    if randomize:
        ordered_idx: list[int] = [remaining.pop(rng.randrange(len(remaining)))]
        verts = query.edge_vertices(parts[ordered_idx[0]])
        while remaining:
            legal = [i for i in remaining if _connected(query, verts, parts[i])]
            pick = rng.choice(legal)
            remaining.remove(pick)
            ordered_idx.append(pick)
            verts = verts | query.edge_vertices(parts[pick])
        return [parts[i] for i in ordered_idx]

    best_pair, best_jn = None, -1
    for i in remaining:
        for j in remaining:
            if i >= j:
                continue
            if not (query.edge_vertices(parts[i]) & query.edge_vertices(parts[j])):
                continue
            jn = joint_number(query, parts[i], parts[j])
            if jn > best_jn:
                best_jn, best_pair = jn, (i, j)
    assert best_pair is not None, "no connected pair — query not weakly connected?"
    ordered_idx = list(best_pair)
    remaining = [i for i in remaining if i not in ordered_idx]
    union_edges = [e for i in ordered_idx for e in parts[i]]
    while remaining:
        verts = query.edge_vertices(union_edges)
        best, best_jn = None, -1
        for i in remaining:
            if not _connected(query, verts, parts[i]):
                continue
            jn = joint_number(query, union_edges, parts[i])
            if jn > best_jn:
                best_jn, best = jn, i
        assert best is not None
        ordered_idx.append(best)
        remaining.remove(best)
        union_edges += parts[best]
    return [parts[i] for i in ordered_idx]
