"""§V concurrency: streaming consistency under real threads + schedule sim."""
import pytest

from repro.concurrency.simulate import simulate, speedup_curve
from repro.concurrency.threaded import ThreadedRunner
from repro.concurrency.transactions import TxTrace, trace_transactions
from repro.core.pyengine import Op, PyTimingEngine, edges_from_pandas
from repro.datagen.queries import generate_query
from repro.datagen.streams import netflow_stream, wikitalk_stream

from .util import match_keyset, reports_to_frame

STREAM = wikitalk_stream(220, n_users=40, seed=3)
NETFLOW = netflow_stream(220, n_ips=50, seed=1)
WINDOW = 80


def serial_reference(query, window, edges):
    eng = PyTimingEngine(query, window)
    reports = eng.run_serial(edges)
    return eng, reports


class TestThreadedConsistency:
    @pytest.mark.parametrize("n_threads", [1, 2, 4, 8])
    @pytest.mark.parametrize("seed,mode", [(1, "random"), (3, "full"), (4, "empty")])
    def test_reports_equal_serial(self, n_threads, seed, mode):
        gq = generate_query(STREAM, 4, order_mode=mode, seed=seed)
        edges = edges_from_pandas(STREAM)
        _, serial = serial_reference(gq.query, WINDOW, edges)
        eng = PyTimingEngine(gq.query, WINDOW)
        runner = ThreadedRunner(eng, n_threads=n_threads)
        concurrent = runner.run(edges)
        assert match_keyset(
            reports_to_frame(concurrent, gq.query), gq.query
        ) == match_keyset(reports_to_frame(serial, gq.query), gq.query)

    @pytest.mark.parametrize("n_threads", [2, 4])
    def test_final_state_equals_serial(self, n_threads):
        gq = generate_query(STREAM, 4, order_mode="random", seed=1)
        edges = edges_from_pandas(STREAM)
        ref, _ = serial_reference(gq.query, WINDOW, edges)
        eng = PyTimingEngine(gq.query, WINDOW)
        ThreadedRunner(eng, n_threads=n_threads).run(edges)
        assert eng.space_nodes() == ref.space_nodes()
        for i, seq in enumerate(eng.parts):
            for lv in range(1, len(seq) + 1):
                got = sorted(
                    tuple(e.eid for e in m) for m, _ in eng._read_part(i, lv)
                )
                exp = sorted(
                    tuple(e.eid for e in m) for m, _ in ref._read_part(i, lv)
                )
                assert got == exp

    @pytest.mark.parametrize("seed", [1, 2])
    def test_all_locks_also_consistent(self, seed):
        gq = generate_query(NETFLOW, 4, order_mode="random", seed=seed)
        edges = edges_from_pandas(NETFLOW)
        _, serial = serial_reference(gq.query, WINDOW, edges)
        eng = PyTimingEngine(gq.query, WINDOW)
        concurrent = ThreadedRunner(eng, n_threads=4, all_locks=True).run(edges)
        assert match_keyset(
            reports_to_frame(concurrent, gq.query), gq.query
        ) == match_keyset(reports_to_frame(serial, gq.query), gq.query)


class TestTraces:
    def test_trace_matches_oplog_shape(self):
        gq = generate_query(STREAM, 4, order_mode="random", seed=1)
        traces = trace_transactions(gq.query, WINDOW, edges_from_pandas(STREAM))
        assert traces, "workload produced no transactions"
        for tr in traces:
            assert tr.kind in ("ins", "del")
            req_items = {i for i, _ in tr.requests}
            for op in tr.ops:
                assert op.item in req_items, "op outside dispatched lock set"

    def test_requests_cover_fig12_shape(self):
        """An edge matching the 1st edge of a TC-subquery needs one X lock."""
        gq = generate_query(STREAM, 4, order_mode="empty", seed=2)
        eng = PyTimingEngine(gq.query, WINDOW)
        edges = edges_from_pandas(STREAM)
        e = next(
            e
            for e in edges
            if any(eng.edge_matches(e, q) for q in range(gq.query.n_edges))
        )
        reqs = eng.lock_requests_ins(e)
        assert reqs
        # every request addresses a real expansion-list item
        for (kind, *rest), mode in reqs:
            assert kind in ("P", "L0")
            assert mode in ("S", "X")


class TestSimulator:
    def _traces(self, seed=1, qsize=4):
        gq = generate_query(NETFLOW, qsize, order_mode="random", seed=seed)
        return trace_transactions(gq.query, WINDOW, edges_from_pandas(NETFLOW))

    def test_single_thread_is_serial(self):
        traces = self._traces()
        r = simulate(traces, 1)
        assert r.makespan == pytest.approx(r.serial_time)
        assert r.speedup == pytest.approx(1.0)

    @pytest.mark.parametrize("n", [2, 4, 8])
    def test_speedup_at_least_one(self, n):
        traces = self._traces()
        assert simulate(traces, n).speedup >= 1.0 - 1e-9

    def test_fine_grained_beats_all_locks(self):
        traces = self._traces(seed=3, qsize=5)
        curves = speedup_curve(traces, [4, 8])
        for n in (4, 8):
            assert curves["Timing"][n] >= curves["All-locks"][n] - 1e-9

    def test_makespan_conserves_work(self):
        """No thread count can beat perfect parallelism."""
        traces = self._traces()
        for n in (2, 4, 8):
            r = simulate(traces, n)
            assert r.makespan * n >= r.serial_time - 1e-9

    def test_disjoint_transactions_fully_parallel(self):
        t1 = TxTrace(1, "ins", [(("P", 0, 1), "X")], [Op("INSERT", ("P", 0, 1), 9)])
        t2 = TxTrace(2, "ins", [(("P", 1, 1), "X")], [Op("INSERT", ("P", 1, 1), 9)])
        r = simulate([t1, t2], 2)
        assert r.speedup == pytest.approx(2.0)

    def test_conflicting_writes_serialize(self):
        t1 = TxTrace(1, "ins", [(("P", 0, 1), "X")], [Op("INSERT", ("P", 0, 1), 9)])
        t2 = TxTrace(2, "ins", [(("P", 0, 1), "X")], [Op("INSERT", ("P", 0, 1), 9)])
        r = simulate([t1, t2], 2)
        assert r.speedup == pytest.approx(1.0)

    def test_shared_reads_run_concurrently(self):
        t1 = TxTrace(1, "ins", [(("P", 0, 1), "S")], [Op("READ", ("P", 0, 1), 9)])
        t2 = TxTrace(2, "ins", [(("P", 0, 1), "S")], [Op("READ", ("P", 0, 1), 9)])
        r = simulate([t1, t2], 2)
        assert r.speedup == pytest.approx(2.0)

    def test_all_locks_blocks_shared_pipeline(self):
        """Fig 12's point: op-level locking pipelines where All-locks can't."""
        mk = lambda ts: TxTrace(  # noqa: E731
            ts,
            "ins",
            [(("P", 0, 1), "X"), (("L0", 1), "X")],
            [Op("INSERT", ("P", 0, 1), 9), Op("INSERT", ("L0", 1), 9)],
        )
        traces = [mk(1), mk(2), mk(3), mk(4)]
        fine = simulate(traces, 4)
        coarse = simulate(traces, 4, all_locks=True)
        assert fine.speedup > coarse.speedup
        assert coarse.speedup == pytest.approx(1.0)
