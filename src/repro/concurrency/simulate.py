"""Discrete-event simulation of the §V lock schedules (Figs 19/20).

Replays a serial transaction trace (``transactions.trace_transactions``)
under N concurrent transaction threads with either locking discipline:

* fine-grained (the paper's, "Timing-N"): one item lock held at a time,
  acquired per-op when the request reaches its wait-list head;
* All-locks-N: every lock acquired up-front and held to transaction end.

Op duration = touched partial matches + a fixed dispatch cost, measured
from the serial run — so the simulated speedup is exactly the speedup
the *schedule* permits, which is what the paper's figures compare (the
substrate note in DESIGN.md §2 explains why wall-clock threading is not
measurable under CPython).
"""
from __future__ import annotations

import heapq
from collections import deque
from dataclasses import dataclass

from ..core.pyengine import READ
from .transactions import TxTrace

S, X = "S", "X"


@dataclass
class SimResult:
    serial_time: float
    makespan: float

    @property
    def speedup(self) -> float:
        return self.serial_time / self.makespan if self.makespan else 1.0


class _Tx:
    __slots__ = ("tid", "trace", "op_idx", "running_until", "held", "acquired_all")

    def __init__(self, tid: int, trace: TxTrace) -> None:
        self.tid = tid
        self.trace = trace
        self.op_idx = 0
        self.running_until: float | None = None
        self.held: list[tuple] = []
        self.acquired_all = False


def simulate(
    traces: list[TxTrace],
    n_threads: int,
    *,
    all_locks: bool = False,
    fixed_cost: float = 1.0,
) -> SimResult:
    """Makespan of the trace under N threads and the chosen locking."""
    serial_time = sum(
        op.cost + fixed_cost for tr in traces for op in tr.ops
    )
    if not traces:
        return SimResult(0.0, 0.0)

    waitlists: dict[tuple, deque] = {}
    holders: dict[tuple, dict[int, str]] = {}

    def wl(item: tuple) -> deque:
        return waitlists.setdefault(item, deque())

    def hold(item: tuple) -> dict[int, str]:
        return holders.setdefault(item, {})

    def compatible(item: tuple, mode: str) -> bool:
        h = hold(item)
        return not h or (mode == S and all(m == S for m in h.values()))

    def at_head(item: tuple, tid: int) -> bool:
        q = wl(item)
        return bool(q) and q[0][0] == tid

    txs = [_Tx(i, tr) for i, tr in enumerate(traces)]
    next_launch = 0
    active: list[_Tx] = []
    finish: list[tuple[float, int, _Tx]] = []
    now = 0.0
    seq = 0

    def launch_more() -> None:
        nonlocal next_launch
        while next_launch < len(txs) and len(active) < n_threads:
            tx = txs[next_launch]
            next_launch += 1
            for item, mode in tx.trace.requests:
                wl(item).append((tx.tid, mode))
            active.append(tx)

    def op_mode(op) -> str:
        return S if op.kind == READ else X

    def try_start(tx: _Tx) -> bool:
        """Attempt to make idle ``tx`` progress at time ``now``."""
        nonlocal seq
        if tx.running_until is not None:
            return False
        if all_locks:
            if not tx.acquired_all:
                need: dict[tuple, str] = {}
                for item, mode in tx.trace.requests:
                    if need.get(item) != X:
                        need[item] = mode
                before = len(tx.held)
                for item in sorted(set(need) - set(tx.held)):
                    if at_head(item, tx.tid) and compatible(item, need[item]):
                        wl(item).popleft()
                        # consume every queued request of this tx on the item
                        waitlists[item] = deque(
                            (t, m) for t, m in wl(item) if t != tx.tid
                        )
                        hold(item)[tx.tid] = need[item]
                        tx.held.append(item)
                if len(tx.held) < len(need):
                    return len(tx.held) > before  # report only *new* progress
                tx.acquired_all = True
            dur = sum(op.cost + fixed_cost for op in tx.trace.ops) or fixed_cost
            tx.running_until = now + dur
            seq += 1
            heapq.heappush(finish, (tx.running_until, seq, tx))
            return True
        # fine-grained: next op acquires exactly one item lock
        op = tx.trace.ops[tx.op_idx]
        mode = op_mode(op)
        if not (at_head(op.item, tx.tid) and compatible(op.item, mode)):
            return False
        wl(op.item).popleft()
        hold(op.item)[tx.tid] = mode
        tx.held = [op.item]
        tx.running_until = now + op.cost + fixed_cost
        seq += 1
        heapq.heappush(finish, (tx.running_until, seq, tx))
        return True

    def retire(tx: _Tx) -> None:
        for item in tx.held:
            hold(item).pop(tx.tid, None)
        tx.held = []
        active.remove(tx)
        for item, _ in tx.trace.requests:  # cancel stale requests
            q = wl(item)
            if any(t == tx.tid for t, _ in q):
                waitlists[item] = deque((t, m) for t, m in q if t != tx.tid)

    launch_more()
    guard = 0
    while active:
        guard += 1
        assert guard < 10_000_000, "simulation runaway"
        progressed = True
        while progressed:
            progressed = False
            for tx in list(active):
                if all_locks and tx.running_until is None:
                    if try_start(tx):
                        progressed = True
                elif tx.running_until is None:
                    if not tx.trace.ops or tx.op_idx >= len(tx.trace.ops):
                        retire(tx)
                        launch_more()
                        progressed = True
                    elif try_start(tx):
                        progressed = True
        if not finish:
            assert not active, "deadlock in simulated schedule"
            break
        now, _, tx = heapq.heappop(finish)
        tx.running_until = None
        if all_locks:
            retire(tx)
            launch_more()
        else:
            # release the single held lock; advance to the next op
            for item in tx.held:
                hold(item).pop(tx.tid, None)
            tx.held = []
            tx.op_idx += 1
            if tx.op_idx >= len(tx.trace.ops):
                retire(tx)
                launch_more()
    return SimResult(serial_time, now)


def speedup_curve(
    traces: list[TxTrace],
    thread_counts: list[int],
    *,
    fixed_cost: float = 1.0,
) -> dict[str, dict[int, float]]:
    """Fine-grained vs All-locks speedups over ``thread_counts``."""
    out = {"Timing": {}, "All-locks": {}}
    for n in thread_counts:
        out["Timing"][n] = simulate(traces, n, fixed_cost=fixed_cost).speedup
        out["All-locks"][n] = simulate(
            traces, n, all_locks=True, fixed_cost=fixed_cost
        ).speedup
    return out
