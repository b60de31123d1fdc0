"""Algorithm 3/4 locking: per-item chronological wait-lists, S/X locks.

A single dispatcher (the "main thread") appends a transaction's lock
requests to the wait-lists of the items it may touch *before* the
transaction's thread starts — in transaction-timestamp order, which is
what upgrades plain serializability to *streaming consistency*
(Def 11/Theorem 4). A thread may hold at most one item lock at a time
(fine-grained mode); it acquires an item iff its request is at the head
of that item's wait-list and the lock state is compatible, and on
release wakes the next head. Requests for ops a transaction ends up
skipping (empty join results) are cancelled when it finishes.
"""
from __future__ import annotations

import threading
from collections import deque
from contextlib import contextmanager

S, X = "S", "X"


class _ItemState:
    __slots__ = ("waitlist", "holders", "cond")

    def __init__(self) -> None:
        self.waitlist: deque[tuple[int, str]] = deque()  # (tid, mode)
        self.holders: dict[int, str] = {}
        self.cond = threading.Condition()


class LockManager:
    """Per-item wait-lists + S/X locks, dispatch in chronological order."""

    def __init__(self) -> None:
        self._items: dict[tuple, _ItemState] = {}
        self._by_tid: dict[int, list[tuple]] = {}
        self._meta = threading.Lock()

    def _item(self, item: tuple) -> _ItemState:
        with self._meta:
            if item not in self._items:
                self._items[item] = _ItemState()
            return self._items[item]

    # ---- main-thread side ------------------------------------------- #
    def dispatch(self, tid: int, requests: list[tuple[tuple, str]]) -> None:
        """Append ``tid``'s lock requests to the item wait-lists (Alg 3)."""
        with self._meta:
            self._by_tid.setdefault(tid, [])
        for item, mode in requests:
            st = self._item(item)
            with st.cond:
                st.waitlist.append((tid, mode))
            with self._meta:
                self._by_tid[tid].append(item)

    # ---- transaction-thread side ------------------------------------- #
    def _compatible(self, st: _ItemState, tid: int, mode: str) -> bool:
        if not st.holders:
            return True
        return mode == S and all(m == S for m in st.holders.values())

    @contextmanager
    def access(self, tid: int, item: tuple, mode: str):
        """Acquire per Algorithm 4, yield, then release and wake the head."""
        st = self._item(item)
        with st.cond:
            while not (
                st.waitlist
                and st.waitlist[0][0] == tid
                and self._compatible(st, tid, mode)
            ):
                st.cond.wait()
            st.waitlist.popleft()
            st.holders[tid] = mode
            with self._meta:
                self._by_tid[tid].remove(item)
            st.cond.notify_all()  # another S head may proceed concurrently
        try:
            yield
        finally:
            with st.cond:
                del st.holders[tid]
                st.cond.notify_all()

    def cancel_remaining(self, tid: int) -> None:
        """Drop ``tid``'s still-pending requests (ops it skipped)."""
        with self._meta:
            items = list(self._by_tid.pop(tid, []))
        for item in items:
            st = self._item(item)
            with st.cond:
                st.waitlist = deque((t, m) for t, m in st.waitlist if t != tid)
                st.cond.notify_all()


class AllLocksManager(LockManager):
    """The All-locks-N strawman: grab every lock up-front, hold to the end.

    ``acquire_all`` must be called before the transaction body; ``access``
    then just checks the lock is held. Chronological dispatch makes this
    deadlock-free (an earlier transaction's requests are ahead in every
    wait-list, so it can always finish first).
    """

    @contextmanager
    def access(self, tid: int, item: tuple, mode: str):
        yield  # already held via acquire_all

    def acquire_all(self, tid: int, requests: list[tuple[tuple, str]]) -> None:
        # strongest mode per item, acquired in canonical order
        need: dict[tuple, str] = {}
        for item, mode in requests:
            if need.get(item) != X:
                need[item] = mode
        for item in sorted(need):
            mode = need[item]
            st = self._item(item)
            with st.cond:
                while not (
                    st.waitlist
                    and st.waitlist[0][0] == tid
                    and self._compatible(st, tid, mode)
                ):
                    st.cond.wait()
                # consume *all* of tid's queued requests for this item
                st.waitlist = deque((t, m) for t, m in st.waitlist if t != tid)
                st.holders[tid] = mode
                with self._meta:
                    self._by_tid[tid] = [
                        i for i in self._by_tid.get(tid, []) if i != item
                    ]
                st.cond.notify_all()

    def release_all(self, tid: int) -> None:
        with self._meta:
            items = list(self._items.values())
        for st in items:
            with st.cond:
                if tid in st.holders:
                    del st.holders[tid]
                    st.cond.notify_all()
