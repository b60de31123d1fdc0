"""TC decomposition of a query (§VI): TCsub enumeration, greedy cover, join order."""
from __future__ import annotations

import random

from ..core.query import Decomposition, QueryGraph
from .greedy import greedy_decomposition, random_decomposition
from .joinorder import order_parts
from .tcsub import tcsub

__all__ = [
    "decompose",
    "tcsub",
    "greedy_decomposition",
    "random_decomposition",
    "order_parts",
]


def decompose(
    query: QueryGraph,
    *,
    strategy: str = "greedy",
    join_order: str = "jn",
    rng: random.Random | None = None,
) -> Decomposition:
    """One-stop decomposition: parts per ``strategy``, ordered per ``join_order``.

    strategy: "greedy" (Alg 6, the paper's method) or "random" (Timing-RD).
    join_order: "jn" (Def 12 joint-number greedy) or "random" (Timing-RJ).
    """
    rng = rng or random.Random(0)
    if strategy == "greedy":
        parts = greedy_decomposition(query)
    elif strategy == "random":
        parts = random_decomposition(query, rng)
    else:  # pragma: no cover - guarded by callers
        raise ValueError(f"unknown strategy {strategy!r}")
    ordered = order_parts(query, parts, rng=rng, randomize=(join_order == "random"))
    d = Decomposition(query, ordered)
    d.validate()
    return d
