"""Query graph model (Definition 3) and timing-order machinery.

A query graph is ``Q = (V(Q), E(Q), L, ≺)``: labelled vertices, directed
edges, and a strict partial order ``≺`` over edges (the *timing order*).
This module is pure Python (driver-side): query graphs are tiny (≤ ~21
edges in the paper) and every streaming decision — prerequisite
subqueries, TC-ness, timing sequences — is metadata the Spark engine
compiles into join predicates.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field
from typing import Iterable, Mapping, Sequence


@dataclass(frozen=True)
class QueryEdge:
    """A directed query edge ``src → dst`` with an optional edge label.

    ``eid`` is the edge's index in ``QueryGraph.edges`` and is the handle
    used everywhere (timing order pairs, expansion lists, column names).
    """

    eid: int
    src: int
    dst: int
    elabel: str | None = None

    @property
    def vertices(self) -> frozenset[int]:
        return frozenset((self.src, self.dst))


class QueryGraph:
    """Vertex-labelled directed query graph with a timing partial order.

    Parameters
    ----------
    vlabels:
        Mapping from vertex id to its label. Every vertex referenced by an
        edge must be present.
    edges:
        Sequence of ``(src, dst)`` or ``(src, dst, elabel)`` tuples. Edge
        ids are their positions in this sequence.
    order:
        Iterable of ``(i, j)`` pairs meaning ``ε_i ≺ ε_j``. The transitive
        closure is taken; a cycle (which would contradict strictness)
        raises ``ValueError``.
    """

    def __init__(
        self,
        vlabels: Mapping[int, str],
        edges: Sequence[tuple],
        order: Iterable[tuple[int, int]] = (),
    ) -> None:
        self.vlabels: dict[int, str] = dict(vlabels)
        self.edges: list[QueryEdge] = []
        seen: set[tuple[int, int, str | None]] = set()
        for i, e in enumerate(edges):
            src, dst = e[0], e[1]
            elabel = e[2] if len(e) > 2 else None
            if src not in self.vlabels or dst not in self.vlabels:
                raise ValueError(f"edge {e} references unlabelled vertex")
            key = (src, dst, elabel)
            if key in seen:
                raise ValueError(f"duplicate query edge {e}")
            seen.add(key)
            self.edges.append(QueryEdge(i, src, dst, elabel))
        self.order: frozenset[tuple[int, int]] = self._close(order, len(self.edges))
        if not self._weakly_connected(range(len(self.edges))):
            raise ValueError("query graph must be weakly connected")

    # ------------------------------------------------------------------ #
    @staticmethod
    def _close(pairs: Iterable[tuple[int, int]], m: int) -> frozenset[tuple[int, int]]:
        """Transitive closure of the timing order; rejects cycles."""
        succ: dict[int, set[int]] = {i: set() for i in range(m)}
        for a, b in pairs:
            if not (0 <= a < m and 0 <= b < m):
                raise ValueError(f"order pair ({a},{b}) references unknown edge")
            succ[a].add(b)
        # Floyd–Warshall-style closure over ≤21 edges is trivially cheap.
        changed = True
        while changed:
            changed = False
            for a in range(m):
                grown = set()
                for b in succ[a]:
                    grown |= succ[b]
                if not grown <= succ[a]:
                    succ[a] |= grown
                    changed = True
        closed = frozenset((a, b) for a in range(m) for b in succ[a])
        for a in range(m):
            if (a, a) in closed:
                raise ValueError("timing order contains a cycle")
        return closed

    # ------------------------------------------------------------------ #
    @property
    def n_edges(self) -> int:
        return len(self.edges)

    @property
    def vertices(self) -> frozenset[int]:
        return frozenset(self.vlabels)

    def edge_vertices(self, eids: Iterable[int]) -> frozenset[int]:
        """Vertices touched by the given query edges."""
        vs: set[int] = set()
        for i in eids:
            vs |= self.edges[i].vertices
        return frozenset(vs)

    def precedes(self, a: int, b: int) -> bool:
        """True iff ``ε_a ≺ ε_b`` (in the transitive closure)."""
        return (a, b) in self.order

    def preq(self, eid: int) -> frozenset[int]:
        """Prerequisite edge set ``Preq(ε) = {ε' | ε' ≺ ε} ∪ {ε}`` (Def 6)."""
        return frozenset({a for (a, b) in self.order if b == eid} | {eid})

    # ------------------------------------------------------------------ #
    def _weakly_connected(self, eids: Iterable[int]) -> bool:
        eids = list(eids)
        if not eids:
            return True
        adj: dict[int, set[int]] = {}
        for i in eids:
            e = self.edges[i]
            adj.setdefault(e.src, set()).add(e.dst)
            adj.setdefault(e.dst, set()).add(e.src)
        start = next(iter(adj))
        seen = {start}
        stack = [start]
        while stack:
            for nb in adj[stack.pop()]:
                if nb not in seen:
                    seen.add(nb)
                    stack.append(nb)
        return seen == set(adj)

    def is_prefix_connected(self, seq: Sequence[int]) -> bool:
        """Def 7: every prefix of ``seq`` induces a weakly connected subquery."""
        vs: set[int] = set()
        for j, eid in enumerate(seq):
            e = self.edges[eid]
            if j > 0 and not (e.vertices & vs):
                return False
            vs |= e.vertices
        return True

    def is_timing_sequence(self, seq: Sequence[int]) -> bool:
        """Def 8: prefix-connected and consecutive edges are ``≺``-chained."""
        if sorted(seq) != sorted(set(seq)):
            return False
        if not self.is_prefix_connected(seq):
            return False
        return all(self.precedes(seq[j], seq[j + 1]) for j in range(len(seq) - 1))

    def timing_sequence(self, eids: Iterable[int] | None = None) -> list[int] | None:
        """A timing sequence for the subquery ``eids`` (whole query if None).

        Returns None when the subquery is not a TC-query. Exponential in the
        worst case but memoised on (frontier-set, last-edge); fine for query
        sizes the paper uses.
        """
        pool = frozenset(range(self.n_edges)) if eids is None else frozenset(eids)
        if not pool:
            return []
        seen_states: set[tuple[frozenset[int], int]] = set()

        def extend(seq: list[int], used: frozenset[int]) -> list[int] | None:
            if len(seq) == len(pool):
                return seq
            vs = self.edge_vertices(seq)
            last = seq[-1]
            for nxt in pool - used:
                if not self.precedes(last, nxt):
                    continue
                if not (self.edges[nxt].vertices & vs):
                    continue
                state = (used | {nxt}, nxt)
                if state in seen_states:
                    continue
                seen_states.add(state)
                out = extend(seq + [nxt], used | {nxt})
                if out is not None:
                    return out
            return None

        for first in pool:
            out = extend([first], frozenset({first}))
            if out is not None:
                return out
        return None

    def is_tc_query(self, eids: Iterable[int] | None = None) -> bool:
        return self.timing_sequence(eids) is not None

    # ------------------------------------------------------------------ #
    def diameter(self) -> int:
        """Undirected diameter of the query graph (IncMat's affected-area d)."""
        verts = sorted(self.vertices)
        adj: dict[int, set[int]] = {v: set() for v in verts}
        for e in self.edges:
            adj[e.src].add(e.dst)
            adj[e.dst].add(e.src)
        best = 0
        for s in verts:
            dist = {s: 0}
            frontier = [s]
            while frontier:
                nxt = []
                for v in frontier:
                    for nb in adj[v]:
                        if nb not in dist:
                            dist[nb] = dist[v] + 1
                            nxt.append(nb)
                frontier = nxt
            best = max(best, max(dist.values()))
        return best

    def distinct_term_labels(self) -> int:
        """``d`` of Theorem 7: distinct (slabel, elabel, dlabel) terms in Q."""
        return len(
            {
                (self.vlabels[e.src], e.elabel, self.vlabels[e.dst])
                for e in self.edges
            }
        )

    # ------------------------------------------------------------------ #
    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        es = ", ".join(
            f"ε{e.eid}:{e.src}->{e.dst}"
            + (f"[{e.elabel}]" if e.elabel else "")
            for e in self.edges
        )
        return f"QueryGraph({es}; ≺={sorted(self.order)})"


def full_order_from_sequence(seq: Sequence[int]) -> list[tuple[int, int]]:
    """Total order pairs making ``seq`` the unique ascending chain."""
    return [(a, b) for a, b in itertools.combinations(seq, 2)]


@dataclass
class Decomposition:
    """A TC decomposition ``D = {Q¹..Qᵏ}`` of a query, with join order.

    ``parts`` are the TC-subqueries in prefix-connected permutation order
    (the L₀ join order); each part carries its timing sequence.
    """

    query: QueryGraph
    parts: list[list[int]] = field(default_factory=list)

    @property
    def k(self) -> int:
        return len(self.parts)

    def validate(self) -> None:
        """Assert D is a valid prefix-connected TC decomposition of Q."""
        flat = [e for p in self.parts for e in p]
        assert sorted(flat) == list(range(self.query.n_edges)), (
            "decomposition must partition E(Q)"
        )
        for p in self.parts:
            assert self.query.is_timing_sequence(p), f"{p} is not a timing sequence"
        covered: set[int] = set()
        for i, p in enumerate(self.parts):
            vs = self.query.edge_vertices(p)
            if i > 0:
                assert vs & covered, "join order is not prefix-connected"
            covered |= vs
