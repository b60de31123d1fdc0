"""Transaction traces for the schedule simulator (Figs 19/20).

A serial reference run of the per-edge engine yields, per transaction,
(a) the worst-case lock-request sequence the main thread dispatches and
(b) the elementary ops actually executed with their measured costs
(number of partial matches touched). The simulator replays these under
either locking discipline to obtain the parallel makespan.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from ..core.pyengine import Edge, Op, PyTimingEngine
from ..core.query import Decomposition, QueryGraph


@dataclass
class TxTrace:
    ts: int
    kind: str  # "ins" / "del"
    requests: list[tuple[tuple, str]]
    ops: list[Op] = field(default_factory=list)


def trace_transactions(
    query: QueryGraph,
    window: int,
    edges: list[Edge],
    decomposition: Decomposition | None = None,
) -> list[TxTrace]:
    """Serial run capturing per-transaction op costs + lock requests."""
    eng = PyTimingEngine(query, window, decomposition=decomposition)
    traces: list[TxTrace] = []
    for e in edges:
        for old in eng.expired_before(e.ts):
            req = eng.lock_requests_del(old)
            eng.run_del(old)
            traces.append(TxTrace(old.ts, "del", req, eng.oplog[-1].ops))
        if any(eng.edge_matches(e, q) for q in range(query.n_edges)):
            req = eng.lock_requests_ins(e)
            eng.run_ins(e)
            traces.append(TxTrace(e.ts, "ins", req, eng.oplog[-1].ops))
            eng.buffer.append(e)
    return traces
