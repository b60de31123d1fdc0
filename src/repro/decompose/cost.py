"""Theorem 7 cost model for TC decompositions.

``N = (1/d)·(|E(Q)| − 1 + k(k−1)/2)`` — the expected number of join
operations triggered by one incoming edge, where ``d`` is the number of
distinct term edge labels in Q and ``k`` the decomposition size. Monotone
increasing in ``k``, which is why Algorithm 6 minimises ``k``.
"""
from __future__ import annotations

from ..core.query import QueryGraph


def expected_join_ops(n_edges: int, k: int, d: int) -> float:
    """Theorem 7's N for a query of ``n_edges`` decomposed into ``k`` parts."""
    if d <= 0:
        raise ValueError("d must be positive")
    if not 1 <= k <= n_edges:
        raise ValueError("k must be in [1, |E(Q)|]")
    return (n_edges - 1 + k * (k - 1) / 2) / d


def query_cost(query: QueryGraph, k: int) -> float:
    """Theorem 7 evaluated with d = distinct term labels of ``query``."""
    return expected_join_ops(query.n_edges, k, query.distinct_term_labels())
