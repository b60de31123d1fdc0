"""Real-thread concurrent execution of the streaming engine (§V).

One thread per transaction (Ins/Del), launched by a main loop that
first dispatches the transaction's worst-case lock requests — exactly
Algorithm 3. Used to *validate streaming consistency* (Theorems 4/6):
under any thread count, reported matches and final stored state must
equal the chronological serial run. (Wall-clock speedup is measured by
the discrete-event simulator instead — CPython's GIL would mask it.)
"""
from __future__ import annotations

import threading

from ..core.pyengine import Edge, PyTimingEngine
from .locks import AllLocksManager, LockManager


class ThreadedRunner:
    """Drives a PyTimingEngine with one thread per edge transaction."""

    def __init__(
        self,
        engine: PyTimingEngine,
        n_threads: int = 4,
        all_locks: bool = False,
    ) -> None:
        self.engine = engine
        self.n_threads = n_threads
        self.all_locks = all_locks
        self.locks = AllLocksManager() if all_locks else LockManager()
        self._sem = threading.Semaphore(n_threads)
        self._report_mu = threading.Lock()
        self.reports: list[dict] = []

    # ------------------------------------------------------------------ #
    def _tx_body(self, tid: int, kind: str, edge: Edge, requests) -> None:
        try:
            if self.all_locks:
                self.locks.acquire_all(tid, requests)
            if kind == "ins":
                rows = self.engine.run_ins(edge, tid=tid, locker=self.locks)
                if rows:
                    with self._report_mu:
                        self.reports += rows
            else:
                self.engine.run_del(edge, tid=tid, locker=self.locks)
        finally:
            if self.all_locks:
                self.locks.release_all(tid)
            self._sem.release()

    def run(self, edges: list[Edge]) -> list[dict]:
        """Process the stream; returns all reported matches (unordered)."""
        threads: list[threading.Thread] = []
        tid = 0
        for e in edges:
            events: list[tuple[str, Edge]] = [
                ("del", old) for old in self.engine.expired_before(e.ts)
            ]
            if any(
                self.engine.edge_matches(e, q)
                for q in range(self.engine.query.n_edges)
            ):
                events.append(("ins", e))
                self.engine.buffer.append(e)
            for kind, edge in events:
                tid += 1
                requests = (
                    self.engine.lock_requests_ins(edge)
                    if kind == "ins"
                    else self.engine.lock_requests_del(edge)
                )
                # Alg 3: dispatch requests, then launch the thread. The
                # semaphore caps concurrent transaction threads at N; the
                # dispatch itself stays strictly chronological.
                self.locks.dispatch(tid, requests)
                self._sem.acquire()
                t = threading.Thread(
                    target=self._tx_body, args=(tid, kind, edge, requests)
                )
                t.start()
                threads.append(t)
        for t in threads:
            t.join()
        return self.reports
