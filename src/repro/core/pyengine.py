"""Per-edge reference engine: Algorithms 1/2 exactly, over MS-tree/IND stores.

This is the paper's engine at original granularity (one transaction per
incoming/expired edge), used for three things:

1. an independent oracle for the Spark micro-batch engine (both must
   agree with the DuckDB SQL oracle and with each other);
2. the operational MS-tree: real O(1) inserts, cascade deletes, O(|Lʲ|·j)
   reads — vs the IND store's full-tuple storage and scan-deletes;
3. the concurrency substrate: every item access can be wrapped by a
   locker (see ``repro.concurrency``), and every transaction logs its
   elementary READ/INSERT/DELETE ops with measured costs (Fig 12 shape),
   which drive the lock-schedule simulator behind Figs 19/20.

Expansion-list items are addressed as ``("P", i, j)`` (item ``Lᵢʲ``,
0-based part, 1-based level) and ``("L0", lv)`` (1-based level of L₀).
"""
from __future__ import annotations

from collections import deque
from contextlib import nullcontext
from dataclasses import dataclass, field
from typing import Iterable

from ..decompose import decompose
from .mstree import INDStore, MSNode, MSTree
from .query import Decomposition, QueryGraph

S, X = "S", "X"  # lock modes
READ, INSERT, DELETE = "READ", "INSERT", "DELETE"


@dataclass(frozen=True)
class Edge:
    """One streaming-graph edge (Def 1)."""

    eid: int
    ts: int
    src: int
    dst: int
    slabel: str
    dlabel: str
    elabel: str | None = None


def edges_from_pandas(pdf) -> list[Edge]:
    """Convert a stream pandas frame (EDGE_COLS) into Edge records."""
    return [
        Edge(int(r.eid), int(r.ts), int(r.src), int(r.dst), r.slabel, r.dlabel,
             None if r.elabel is None else str(r.elabel))
        for r in pdf.itertuples(index=False)
    ]


@dataclass
class Op:
    """One elementary operation over an expansion-list item."""

    kind: str  # READ / INSERT / DELETE
    item: tuple
    cost: int  # partial matches touched (plus 1 fixed dispatch cost in the sim)


@dataclass
class TxRecord:
    """One executed transaction (Ins/Del) with its op trace."""

    ts: int
    kind: str  # "ins" / "del"
    ops: list[Op] = field(default_factory=list)


class _NullLocker:
    """Serial execution: item accesses are unguarded, cancels are no-ops."""

    def access(self, tid, item, mode):
        return nullcontext()

    def cancel_remaining(self, tid):
        pass


class PyTimingEngine:
    """Streaming engine per Algorithms 1–3, driver-side, per-edge."""

    def __init__(
        self,
        query: QueryGraph,
        window: int,
        decomposition: Decomposition | None = None,
        use_mstree: bool = True,
    ) -> None:
        self.query = query
        self.window = int(window)
        self.decomp = decomposition or decompose(query)
        self.parts = self.decomp.parts
        self.k = len(self.parts)
        self.use_mstree = use_mstree
        if use_mstree:
            self.part_stores = [MSTree(len(seq)) for seq in self.parts]
            self.l0_store = MSTree(self.k) if self.k > 1 else None
        else:
            self.part_stores = [INDStore(len(seq)) for seq in self.parts]
            self.l0_store = INDStore(self.k) if self.k > 1 else None
        self.buffer: deque[Edge] = deque()  # window edges that match some query edge
        self.reports: list[dict] = []
        self.oplog: list[TxRecord] = []

    # ------------------------------------------------------------------ #
    # Matching primitives
    # ------------------------------------------------------------------ #
    def edge_matches(self, edge: Edge, qeid: int) -> bool:
        q = self.query.edges[qeid]
        if self.query.vlabels[q.src] != edge.slabel:
            return False
        if self.query.vlabels[q.dst] != edge.dlabel:
            return False
        if q.elabel is not None and q.elabel != edge.elabel:
            return False
        return (edge.src == edge.dst) == (q.src == q.dst)

    def matched_positions(self, edge: Edge) -> list[tuple[int, int]]:
        """All (part index, 0-based position) the edge matches."""
        out = []
        for i, seq in enumerate(self.parts):
            for j, qeid in enumerate(seq):
                if self.edge_matches(edge, qeid):
                    out.append((i, j))
        return out

    def _assign(self, part_i: int, edges: list[Edge]) -> dict[int, int]:
        """Vertex mapping F of a part match in sequential form."""
        F: dict[int, int] = {}
        for qeid, e in zip(self.parts[part_i], edges):
            q = self.query.edges[qeid]
            F[q.src], F[q.dst] = e.src, e.dst
        return F

    def _compatible_extend(
        self, part_i: int, base: list[Edge], qeid: int, edge: Edge
    ) -> bool:
        """Can ``edge`` (matching ``qeid``, arriving now) extend ``base``?"""
        if min(e.ts for e in base) <= edge.ts - self.window:
            return False  # base no longer fully inside the window at edge.ts
        F = self._assign(part_i, base)
        q = self.query.edges[qeid]
        for qv, dv in ((q.src, edge.src), (q.dst, edge.dst)):
            if qv in F:
                if F[qv] != dv:
                    return False
            elif dv in F.values():
                return False  # bijectivity
        if q.src not in F and q.dst not in F and q.src != q.dst:
            if edge.src == edge.dst:
                return False
        return True

    def _l0_compatible(self, prefix_parts: list[list[Edge]], now: int) -> bool:
        """Structure + timing + window check for a joined L₀ match."""
        F: dict[int, int] = {}
        ts: dict[int, int] = {}
        for i, pmatch in enumerate(prefix_parts):
            for qeid, e in zip(self.parts[i], pmatch):
                q = self.query.edges[qeid]
                ts[qeid] = e.ts
                for qv, dv in ((q.src, e.src), (q.dst, e.dst)):
                    if qv in F:
                        if F[qv] != dv:
                            return False
                    elif dv in F.values():
                        return False
                    else:
                        F[qv] = dv
        for a, b in self.query.order:
            if a in ts and b in ts and not ts[a] < ts[b]:
                return False
        if min(ts.values()) <= now - self.window:
            return False
        return True

    def _report_row(self, part_matches: list[list[Edge]]) -> dict:
        F: dict[int, int] = {}
        row: dict = {}
        for i, pmatch in enumerate(part_matches):
            for qeid, e in zip(self.parts[i], pmatch):
                q = self.query.edges[qeid]
                F[q.src], F[q.dst] = e.src, e.dst
                row[f"e{qeid}"] = e.eid
                row[f"t{qeid}"] = e.ts
        for u, dv in F.items():
            row[f"v{u}"] = dv
        return row

    # ------------------------------------------------------------------ #
    # Store adapters (MS-tree vs IND)
    # ------------------------------------------------------------------ #
    def _read_part(self, i: int, lv: int) -> list[tuple[list[Edge], object]]:
        return self.part_stores[i].read(lv)

    def _insert_part(self, i: int, base_handle, base: list[Edge], edge: Edge):
        if self.use_mstree:
            return self.part_stores[i].insert(base_handle, edge)
        self.part_stores[i].insert(None, edge, base)
        return None

    def _read_l0(self, lv: int) -> list[tuple[list[list[Edge]], object]]:
        """Ω(L₀^lv) as (list of part matches, handle)."""
        out = []
        if self.use_mstree:
            for payloads, node in self.l0_store.read(lv):
                parts = [
                    self.part_stores[x].backtrack(leaf)
                    for x, leaf in enumerate(payloads)
                ]
                out.append((parts, node))
        else:
            out = self.l0_store.read(lv)
        return out

    def _insert_l0(self, base_handle, base: list[list[Edge]], part_leaf, pmatch):
        """Insert base + one more part match at L₀ level len(base)+1."""
        if self.use_mstree:
            return self.l0_store.insert(base_handle, part_leaf)
        self.l0_store.insert(None, pmatch, base)
        return None

    # ------------------------------------------------------------------ #
    # Transactions
    # ------------------------------------------------------------------ #
    def lock_requests_ins(self, edge: Edge) -> list[tuple[tuple, str]]:
        """Worst-case item/lock sequence of Ins(σ) (Fig 12), dispatch order."""
        reqs: list[tuple[tuple, str]] = []
        for i, j in self.matched_positions(edge):
            m = len(self.parts[i])
            if j == 0:
                reqs.append((("P", i, 1), X))
            else:
                reqs.append((("P", i, j), S))
                reqs.append((("P", i, j + 1), X))
            if j == m - 1 and self.k > 1:
                if i == 0:
                    reqs.append((("L0", 1), X))
                else:
                    reqs.append((("L0", i), S))
                    reqs.append((("L0", i + 1), X))
                for lv in range(i + 2, self.k + 1):
                    reqs.append((("P", lv - 1, len(self.parts[lv - 1])), S))
                    reqs.append((("L0", lv), X))
        return reqs

    def lock_requests_del(self, edge: Edge) -> list[tuple[tuple, str]]:
        """Worst-case item/lock sequence of Del(σ) (Algorithm 2)."""
        reqs: list[tuple[tuple, str]] = []
        touched_l0_from: int | None = None
        for i, seq in enumerate(self.parts):
            if any(self.edge_matches(edge, q) for q in seq):
                for lv in range(1, len(seq) + 1):
                    reqs.append((("P", i, lv), X))
                if self.k > 1:
                    touched_l0_from = (
                        i + 1
                        if touched_l0_from is None
                        else min(touched_l0_from, i + 1)
                    )
        if touched_l0_from is not None:
            for lv in range(touched_l0_from, self.k + 1):
                reqs.append((("L0", lv), X))
        return reqs

    def run_ins(self, edge: Edge, tid=None, locker=None) -> list[dict]:
        """Algorithm 1. Returns the newly reported complete matches."""
        locker = locker or _NullLocker()
        rec = TxRecord(edge.ts, "ins")
        new_full: list[dict] = []
        try:
            for i, j in self.matched_positions(edge):
                seq = self.parts[i]
                qeid = seq[j]
                if j == 0:
                    with locker.access(tid, ("P", i, 1), X):
                        h = self._insert_part(i, None, [], edge)
                        rec.ops.append(Op(INSERT, ("P", i, 1), 1))
                    delta = [([edge], h)]
                else:
                    with locker.access(tid, ("P", i, j), S):
                        base = self._read_part(i, j)
                        rec.ops.append(Op(READ, ("P", i, j), len(base)))
                    joined = [
                        (m + [edge], hh)
                        for m, hh in base
                        if self._compatible_extend(i, m, qeid, edge)
                    ]
                    if joined:
                        with locker.access(tid, ("P", i, j + 1), X):
                            delta = [
                                (m, self._insert_part(i, hh, m[:-1], edge))
                                for m, hh in joined
                            ]
                            rec.ops.append(Op(INSERT, ("P", i, j + 1), len(delta)))
                    else:
                        delta = []
                if not delta or j != len(seq) - 1:
                    continue
                # Δ(Qⁱ) exists — join through L₀ (Alg 1 lines 11–22).
                if self.k == 1:
                    new_full += [self._report_row([m]) for m, _ in delta]
                    continue
                if i == 0:
                    with locker.access(tid, ("L0", 1), X):
                        l0_delta = [
                            ([m], self._insert_l0(None, [], h2, m))
                            for m, h2 in delta
                        ]
                        rec.ops.append(Op(INSERT, ("L0", 1), len(l0_delta)))
                else:
                    with locker.access(tid, ("L0", i), S):
                        base0 = self._read_l0(i)
                        rec.ops.append(Op(READ, ("L0", i), len(base0)))
                    cand = [
                        (pm + [m], h0, h2, m)
                        for pm, h0 in base0
                        for m, h2 in delta
                        if self._l0_compatible(pm + [m], edge.ts)
                    ]
                    if not cand:
                        continue
                    with locker.access(tid, ("L0", i + 1), X):
                        l0_delta = [
                            (pm, self._insert_l0(h0, pm[:-1], h2, m))
                            for pm, h0, h2, m in cand
                        ]
                        rec.ops.append(Op(INSERT, ("L0", i + 1), len(l0_delta)))
                lv = i + 1  # current L₀ level of l0_delta (1-based)
                while lv < self.k and l0_delta:
                    nxt = lv  # part index of Q^{lv+1} is lv (0-based)
                    with locker.access(
                        tid, ("P", nxt, len(self.parts[nxt])), S
                    ):
                        omat = self._read_part(nxt, len(self.parts[nxt]))
                        rec.ops.append(
                            Op(READ, ("P", nxt, len(self.parts[nxt])), len(omat))
                        )
                    cand2 = [
                        (pm + [m2], h0, h2, m2)
                        for pm, h0 in l0_delta
                        for m2, h2 in omat
                        if self._l0_compatible(pm + [m2], edge.ts)
                    ]
                    if not cand2:
                        l0_delta = []
                        break
                    with locker.access(tid, ("L0", lv + 1), X):
                        l0_delta = [
                            (pm, self._insert_l0(h0, pm[:-1], h2, m2))
                            for pm, h0, h2, m2 in cand2
                        ]
                        rec.ops.append(Op(INSERT, ("L0", lv + 1), len(l0_delta)))
                    lv += 1
                if lv == self.k:
                    new_full += [self._report_row(pm) for pm, _ in l0_delta]
        finally:
            locker.cancel_remaining(tid)
        self.oplog.append(rec)
        return new_full

    # ------------------------------------------------------------------ #
    def run_del(self, edge: Edge, tid=None, locker=None) -> None:
        """Algorithm 2 with §V-C partial/total removal on MS-trees."""
        locker = locker or _NullLocker()
        rec = TxRecord(edge.ts, "del")
        try:
            direct_lvls: set[int] = set()
            for i, seq in enumerate(self.parts):
                positions = [
                    j + 1 for j, q in enumerate(seq) if self.edge_matches(edge, q)
                ]
                if not positions:
                    continue
                if self.use_mstree:
                    last_hit = self._del_part_ms(i, edge, positions, rec, tid, locker)
                else:
                    last_hit = self._del_part_ind(i, edge, positions, rec, tid, locker)
                if last_hit and self.k > 1:
                    direct_lvls.add(i + 1)
            if direct_lvls:
                self._del_l0(edge, direct_lvls, rec, tid, locker)
        finally:
            locker.cancel_remaining(tid)
        self.oplog.append(rec)

    def _del_part_ms(self, i, edge, positions, rec, tid, locker) -> bool:
        tree: MSTree = self.part_stores[i]
        m = len(self.parts[i])
        pending: list[MSNode] = []
        tops: list[MSNode] = []
        last_hit = False
        for lv in range(min(positions), m + 1):
            with locker.access(tid, ("P", i, lv), X):
                hits = list(tree.delete_children_of(pending))
                if lv in positions:
                    direct = tree.delete_level(lv, lambda e: e.eid == edge.eid)
                    tops += direct
                    hits += direct
                rec.ops.append(Op(DELETE, ("P", i, lv), len(hits)))
            if not hits and lv >= max(positions):
                break
            pending = hits
            if hits and lv == m:
                last_hit = True
        for n in tops:
            tree.total_remove(n)
        return last_hit

    def _del_part_ind(self, i, edge, positions, rec, tid, locker) -> bool:
        store: INDStore = self.part_stores[i]
        m = len(self.parts[i])
        last_hit = False
        for lv in range(1, m + 1):
            with locker.access(tid, ("P", i, lv), X):
                item = store.items[lv - 1]
                store.touched_on_delete += len(item)
                keep = [t for t in item if all(e.eid != edge.eid for e in t)]
                n_del = len(item) - len(keep)
                store.items[lv - 1] = keep
                rec.ops.append(Op(DELETE, ("P", i, lv), len(item)))
            if n_del and lv == m:
                last_hit = True
        return last_hit

    def _del_l0(self, edge, direct_lvls: set[int], rec, tid, locker) -> None:
        """Scan L₀ from the earliest affected level (Alg 2 line 7).

        ``direct_lvls`` are the L₀ levels whose part lost complete matches;
        the scan may only stop early once past the deepest direct level.
        """
        from_lv, max_direct = min(direct_lvls), max(direct_lvls)
        if self.use_mstree:
            tree: MSTree = self.l0_store
            pending: list[MSNode] = []
            tops: list[MSNode] = []
            for lv in range(from_lv, self.k + 1):
                with locker.access(tid, ("L0", lv), X):
                    hits = list(tree.delete_children_of(pending))
                    if lv in direct_lvls:
                        direct = tree.delete_level(lv, lambda leaf: leaf.removed)
                        tops += direct
                        hits += direct
                    rec.ops.append(Op(DELETE, ("L0", lv), len(hits)))
                if not hits and lv >= max_direct:
                    break
                pending = hits
            for n in tops:
                tree.total_remove(n)
        else:
            store: INDStore = self.l0_store
            for lv in range(from_lv, self.k + 1):
                with locker.access(tid, ("L0", lv), X):
                    item = store.items[lv - 1]
                    store.touched_on_delete += len(item)
                    keep = [
                        t
                        for t in item
                        if all(e.eid != edge.eid for pm in t for e in pm)
                    ]
                    n_del = len(item) - len(keep)
                    store.items[lv - 1] = keep
                    rec.ops.append(Op(DELETE, ("L0", lv), len(item)))
                if not n_del and lv >= max_direct:
                    break

    # ------------------------------------------------------------------ #
    # Serial driver
    # ------------------------------------------------------------------ #
    def expired_before(self, ts: int) -> list[Edge]:
        """Pop buffered edges that leave the window ``(ts − |W|, ts]``."""
        out = []
        while self.buffer and self.buffer[0].ts <= ts - self.window:
            out.append(self.buffer.popleft())
        return out

    def run_serial(self, edges: Iterable[Edge]) -> list[dict]:
        """Chronological per-edge processing; returns all reported matches."""
        for e in edges:
            for old in self.expired_before(e.ts):
                self.run_del(old)
            if any(
                self.edge_matches(e, q) for q in range(self.query.n_edges)
            ):
                self.reports += self.run_ins(e)
                self.buffer.append(e)
        return self.reports

    # ------------------------------------------------------------------ #
    def space_nodes(self) -> int:
        """Current storage footprint (MS-tree nodes or IND cells)."""
        if self.use_mstree:
            n = sum(t.node_count() for t in self.part_stores)
            if self.l0_store is not None:
                n += self.l0_store.node_count()
            return n
        n = sum(s.cell_count() for s in self.part_stores)
        if self.l0_store is not None:
            n += sum(
                len(t) for item in self.l0_store.items for t in item
            )  # one slot per component part-match reference
        return n
