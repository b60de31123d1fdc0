"""Algorithm 6: greedy minimum-cardinality TC decomposition (+ random variant).

Theorem 7's cost model is monotone in the number of TC-subqueries ``k``,
so the paper greedily covers ``E(Q)`` by repeatedly taking the largest
remaining TC-subquery disjoint from those already chosen. Singleton
edges are always TC-subqueries, so a cover always exists.
"""
from __future__ import annotations

import random

from ..core.query import QueryGraph
from .tcsub import tcsub


def greedy_decomposition(
    query: QueryGraph, subs: dict[frozenset[int], list[int]] | None = None
) -> list[list[int]]:
    """Unordered TC decomposition per Algorithm 6 (largest-first, disjoint)."""
    subs = subs if subs is not None else tcsub(query)
    # Deterministic tie-break: size desc, then lexicographic edge set.
    candidates = sorted(subs.items(), key=lambda kv: (-len(kv[0]), sorted(kv[0])))
    chosen: list[list[int]] = []
    covered: set[int] = set()
    for eset, seq in candidates:
        if covered >= set(range(query.n_edges)):
            break
        if eset & covered:
            continue
        chosen.append(list(seq))
        covered |= eset
    assert covered == set(range(query.n_edges)), "greedy cover failed"
    return chosen


def random_decomposition(
    query: QueryGraph,
    rng: random.Random,
    subs: dict[frozenset[int], list[int]] | None = None,
) -> list[list[int]]:
    """Timing-RD: randomly draw disjoint TC-subqueries until E(Q) is covered."""
    subs = subs if subs is not None else tcsub(query)
    pool = list(subs.items())
    rng.shuffle(pool)
    chosen: list[list[int]] = []
    covered: set[int] = set()
    for eset, seq in pool:
        if eset & covered:
            continue
        chosen.append(list(seq))
        covered |= eset
        if covered == set(range(query.n_edges)):
            break
    assert covered == set(range(query.n_edges))
    return chosen
