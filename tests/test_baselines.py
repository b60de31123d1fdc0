"""SJ-tree and IncMat baselines: exactness + the paper's cost relationships."""
import pytest

from repro.baselines.incmat import IncMatEngine
from repro.baselines.sjtree import SJTreeEngine, bfs_edge_order
from repro.baselines.static_iso import (
    STRATEGIES,
    matching_order,
    term_frequencies,
)
from repro.core.engine import TimingEngine
from repro.datagen.queries import generate_query
from repro.datagen.streams import netflow_stream, wikitalk_stream
from repro.experiments.harness import run_stream

from .util import match_keyset, oracle_reported, paper_query

WINDOW = 60
STREAMS = {
    "netflow": netflow_stream(150, n_ips=40, seed=0),
    "wikitalk": wikitalk_stream(150, n_users=35, seed=1),
}


class TestOrders:
    def test_bfs_edge_order_prefix_connected(self):
        q = paper_query()
        order = bfs_edge_order(q)
        assert sorted(order) == list(range(q.n_edges))
        assert q.is_prefix_connected(order)

    @pytest.mark.parametrize("strategy", STRATEGIES)
    def test_matching_orders_prefix_connected(self, strategy):
        stream = STREAMS["wikitalk"]
        gq = generate_query(stream, 6, order_mode="random", seed=2)
        order = matching_order(gq.query, strategy, term_frequencies(stream))
        assert sorted(order) == list(range(6))
        assert gq.query.is_prefix_connected(order)

    def test_quicksi_starts_rare(self):
        """QuickSI's QI-sequence begins at the least frequent term edge."""
        stream = STREAMS["netflow"]
        gq = generate_query(stream, 5, order_mode="random", seed=3)
        freq = term_frequencies(stream)
        from repro.baselines.static_iso import _edge_freq

        order = matching_order(gq.query, "quicksi", freq)
        fs = [_edge_freq(gq.query, e, freq) for e in range(5)]
        assert fs[order[0]] == min(fs)


class TestSJTree:
    @pytest.mark.parametrize("dataset", sorted(STREAMS))
    @pytest.mark.parametrize("seed,mode", [(0, "random"), (1, "full"), (2, "empty")])
    def test_exact_answers(self, spark, dataset, seed, mode):
        stream = STREAMS[dataset]
        gq = generate_query(stream, 3, order_mode=mode, seed=seed)
        m = run_stream(SJTreeEngine(spark, gq.query, WINDOW), stream, 50)
        exp = oracle_reported(stream, gq.query, WINDOW)
        assert match_keyset(m.matches, gq.query) == match_keyset(exp, gq.query)

    def test_stores_discardable_partials(self, spark):
        """The paper's key claim: SJ-tree keeps what Timing prunes."""
        stream = STREAMS["wikitalk"]
        gq = generate_query(stream, 4, order_mode="full", seed=1)
        sj = SJTreeEngine(spark, gq.query, WINDOW)
        tm = TimingEngine(spark, gq.query, WINDOW)
        ms = run_stream(sj, stream, 50)
        mt = run_stream(tm, stream, 50)
        assert match_keyset(ms.matches, gq.query) == match_keyset(
            mt.matches, gq.query
        )
        assert ms.avg_space >= mt.avg_space


class TestIncMat:
    @pytest.mark.parametrize("strategy", STRATEGIES)
    def test_exact_answers(self, spark, strategy):
        stream = STREAMS["netflow"]
        gq = generate_query(stream, 3, order_mode="random", seed=4)
        eng = IncMatEngine(
            spark, gq.query, WINDOW, strategy=strategy,
            term_freq=term_frequencies(stream),
        )
        m = run_stream(eng, stream, 50)
        exp = oracle_reported(stream, gq.query, WINDOW)
        assert match_keyset(m.matches, gq.query) == match_keyset(exp, gq.query)

    def test_exact_answers_wikitalk_full_order(self, spark):
        stream = STREAMS["wikitalk"]
        gq = generate_query(stream, 4, order_mode="full", seed=2)
        eng = IncMatEngine(
            spark, gq.query, WINDOW, strategy="quicksi",
            term_freq=term_frequencies(stream),
        )
        m = run_stream(eng, stream, 50)
        exp = oracle_reported(stream, gq.query, WINDOW)
        assert match_keyset(m.matches, gq.query) == match_keyset(exp, gq.query)

    def test_keeps_window_graph(self, spark):
        """IncMat must buffer the window adjacency (space cost, Figs 17/18)."""
        stream = STREAMS["netflow"]
        gq = generate_query(stream, 3, order_mode="random", seed=4)
        eng = IncMatEngine(spark, gq.query, WINDOW, strategy="quicksi")
        m = run_stream(eng, stream, 50)
        assert eng.space_sample().window_edges > 0
        assert m.avg_space > 0
