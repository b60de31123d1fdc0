"""LockManager unit tests: wait-list FIFO, S/X compatibility, cancel, All-locks."""
import threading
import time

import pytest

from repro.concurrency.locks import AllLocksManager, LockManager, S, X

ITEM = ("P", 0, 1)


def spawn(fn):
    t = threading.Thread(target=fn)
    t.start()
    return t


class TestFifoOrdering:
    def test_head_of_waitlist_required(self):
        lm = LockManager()
        lm.dispatch(1, [(ITEM, X)])
        lm.dispatch(2, [(ITEM, X)])
        log = []

        def t2():
            with lm.access(2, ITEM, X):
                log.append(2)

        def t1():
            time.sleep(0.05)  # launch t1's access late — it must still win
            with lm.access(1, ITEM, X):
                log.append(1)

        th2, th1 = spawn(t2), spawn(t1)
        th1.join(timeout=5)
        th2.join(timeout=5)
        assert log == [1, 2]

    def test_shared_locks_coexist(self):
        lm = LockManager()
        lm.dispatch(1, [(ITEM, S)])
        lm.dispatch(2, [(ITEM, S)])
        inside = []
        barrier = threading.Barrier(2, timeout=5)

        def reader(tid):
            def fn():
                with lm.access(tid, ITEM, S):
                    inside.append(tid)
                    barrier.wait()  # both must be inside simultaneously
            return fn

        ths = [spawn(reader(1)), spawn(reader(2))]
        for t in ths:
            t.join(timeout=5)
        assert sorted(inside) == [1, 2]

    def test_exclusive_blocks_shared(self):
        lm = LockManager()
        lm.dispatch(1, [(ITEM, X)])
        lm.dispatch(2, [(ITEM, S)])
        order = []

        def t1():
            with lm.access(1, ITEM, X):
                time.sleep(0.05)
                order.append(1)

        def t2():
            with lm.access(2, ITEM, S):
                order.append(2)

        ths = [spawn(t1), spawn(t2)]
        for t in ths:
            t.join(timeout=5)
        assert order == [1, 2]

    def test_cancel_unblocks_waiters(self):
        lm = LockManager()
        lm.dispatch(1, [(ITEM, X)])
        lm.dispatch(2, [(ITEM, X)])
        done = []

        def t2():
            with lm.access(2, ITEM, X):
                done.append(2)

        th = spawn(t2)
        time.sleep(0.05)
        assert not done  # blocked behind tid 1's pending request
        lm.cancel_remaining(1)
        th.join(timeout=5)
        assert done == [2]


class TestAllLocks:
    def test_acquire_all_then_release(self):
        lm = AllLocksManager()
        items = [("P", 0, 1), ("L0", 1)]
        lm.dispatch(1, [(i, X) for i in items])
        lm.acquire_all(1, [(i, X) for i in items])
        # a later transaction cannot sneak in on any item
        lm.dispatch(2, [(items[0], X)])
        got = []
        th = spawn(lambda: (lm.acquire_all(2, [(items[0], X)]), got.append(2)))
        time.sleep(0.05)
        assert not got
        lm.release_all(1)
        th.join(timeout=5)
        assert got == [2]
        lm.release_all(2)

    def test_strongest_mode_wins(self):
        lm = AllLocksManager()
        lm.dispatch(1, [(ITEM, S), (ITEM, X)])
        lm.acquire_all(1, [(ITEM, S), (ITEM, X)])
        st = lm._item(ITEM)
        assert st.holders[1] == X
        lm.release_all(1)
