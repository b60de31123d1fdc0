"""§VII-B query generation: random walks + randomized timing orders.

A query structure is a random-walk subgraph of the (snapshot of the)
data stream; its timing order sets ``εᵢ ≺ εⱼ`` iff ``εᵢ`` precedes
``εⱼ`` both in a random permutation *and* in data-timestamp order — so
the order is random yet the walk itself remains a valid embedding
(structure + chronology), exactly the paper's recipe. Per structure the
paper uses 5 orders: one full (data-timestamp total order), one empty,
three random. §VII-G additionally targets a decomposition size ``k`` by
resampling permutations.
"""
from __future__ import annotations

import random
from dataclasses import dataclass

import pandas as pd

from ..core.query import QueryGraph
from ..decompose import decompose


@dataclass
class GeneratedQuery:
    query: QueryGraph
    order_mode: str  # "full" | "empty" | "random"
    walk_eids: list[int]  # data-edge ids of the source embedding


def _walk_structure(
    stream: pd.DataFrame, size: int, rng: random.Random, max_tries: int = 200
):
    """Random-walk a connected ``size``-edge subgraph; returns edge rows."""
    records = stream.to_dict("records")
    by_vertex: dict[int, list[int]] = {}
    for idx, r in enumerate(records):
        by_vertex.setdefault(r["src"], []).append(idx)
        by_vertex.setdefault(r["dst"], []).append(idx)
    for _ in range(max_tries):
        first = rng.randrange(len(records))
        chosen = [first]
        chosen_set = {first}
        verts = {records[first]["src"], records[first]["dst"]}
        dead = 0
        while len(chosen) < size and dead < 50:
            v = rng.choice(sorted(verts))
            cand = by_vertex[v]
            idx = cand[rng.randrange(len(cand))]
            r = records[idx]
            if idx in chosen_set or r["src"] == r["dst"]:
                dead += 1
                continue
            # avoid duplicate (src,dst,elabel) triples — query edges are a set
            if any(
                records[c]["src"] == r["src"]
                and records[c]["dst"] == r["dst"]
                and records[c]["elabel"] == r["elabel"]
                for c in chosen
            ):
                dead += 1
                continue
            chosen.append(idx)
            chosen_set.add(idx)
            verts |= {r["src"], r["dst"]}
            dead = 0
        if len(chosen) == size:
            return [records[i] for i in chosen]
    raise RuntimeError(f"could not grow a {size}-edge walk")


def _build_query(rows: list[dict], order_mode: str, rng: random.Random) -> QueryGraph:
    vids = sorted({r["src"] for r in rows} | {r["dst"] for r in rows})
    vmap = {v: i for i, v in enumerate(vids)}
    vlabels: dict[int, str] = {}
    for r in rows:
        vlabels[vmap[r["src"]]] = r["slabel"]
        vlabels[vmap[r["dst"]]] = r["dlabel"]
    edges = [(vmap[r["src"]], vmap[r["dst"]], r["elabel"]) for r in rows]
    m = len(rows)
    if order_mode == "empty":
        order: list[tuple[int, int]] = []
    elif order_mode == "full":
        order = [
            (a, b)
            for a in range(m)
            for b in range(m)
            if rows[a]["ts"] < rows[b]["ts"]
        ]
    elif order_mode == "random":
        perm = list(range(m))
        rng.shuffle(perm)
        pos = {e: i for i, e in enumerate(perm)}
        order = [
            (a, b)
            for a in range(m)
            for b in range(m)
            if pos[a] < pos[b] and rows[a]["ts"] < rows[b]["ts"]
        ]
    else:  # pragma: no cover
        raise ValueError(order_mode)
    return QueryGraph(vlabels, edges, order)


def generate_query(
    stream: pd.DataFrame,
    size: int,
    *,
    order_mode: str = "random",
    seed: int = 0,
) -> GeneratedQuery:
    """One §VII-B query of ``size`` edges over ``stream``."""
    rng = random.Random(seed)
    rows = _walk_structure(stream, size, rng)
    q = _build_query(rows, order_mode, rng)
    return GeneratedQuery(q, order_mode, [r["eid"] for r in rows])


def generate_query_with_k(
    stream: pd.DataFrame,
    size: int,
    k: int,
    *,
    seed: int = 0,
    max_tries: int = 300,
) -> GeneratedQuery:
    """§VII-G: a query whose greedy TC decomposition has exactly ``k`` parts.

    k = size  ⇒ empty order (every edge its own TC-subquery);
    k = 1     ⇒ full data-timestamp order over a walk whose timestamp
    order is prefix-connected (resampled until so); otherwise resample
    random permutations until the greedy decomposition size is ``k``.
    """
    rng = random.Random(seed)
    if k == size:
        rows = _walk_structure(stream, size, rng)
        return GeneratedQuery(_build_query(rows, "empty", rng), "empty",
                              [r["eid"] for r in rows])
    for attempt in range(max_tries):
        rows = _walk_structure(stream, size, rng)
        mode = "full" if k == 1 else "random"
        q = _build_query(rows, mode, rng)
        try:
            d = decompose(q)
        except AssertionError:  # pragma: no cover - defensive
            continue
        if d.k == k:
            return GeneratedQuery(q, mode, [r["eid"] for r in rows])
    raise RuntimeError(f"no query of size {size} with k={k} after {max_tries} tries")


def queryset(
    stream: pd.DataFrame,
    sizes: list[int],
    *,
    n_structures: int = 2,
    seed: int = 0,
) -> list[GeneratedQuery]:
    """The §VII-B workload: per size, structures × {full, empty, random…}."""
    out: list[GeneratedQuery] = []
    s = seed
    for size in sizes:
        for i in range(n_structures):
            for mode in ("full", "empty", "random"):
                out.append(generate_query(stream, size, order_mode=mode, seed=s))
                s += 1
    return out
