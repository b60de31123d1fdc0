"""The Spark micro-batch TimingEngine vs the DuckDB oracle and the
per-edge reference engine — the core correctness matrix of the repo."""
import pandas as pd
import pytest

from repro.core.engine import TimingEngine, TimingIndEngine
from repro.core.pyengine import PyTimingEngine, edges_from_pandas
from repro.datagen.queries import generate_query
from repro.datagen.streams import netflow_stream, social_stream, wikitalk_stream
from repro.decompose import decompose
from repro.experiments.harness import run_stream

from .util import match_keyset, oracle_reported, reports_to_frame

WINDOW = 60
STREAMS = {
    "netflow": netflow_stream(160, n_ips=40, seed=0),
    "wikitalk": wikitalk_stream(160, n_users=35, seed=1),
    "social": social_stream(160, n_users=40, seed=2),
}


def spark_reported(spark, query, stream, window, batch=40, engine_cls=TimingEngine):
    eng = engine_cls(spark, query, window)
    m = run_stream(eng, stream, batch)
    return m.matches, eng


CASES = [
    ("netflow", "random", 0, 3),
    ("netflow", "full", 1, 4),
    ("wikitalk", "random", 1, 4),
    ("wikitalk", "empty", 2, 3),
    ("social", "random", 3, 4),
    ("social", "full", 0, 3),
]


@pytest.mark.parametrize("dataset,mode,seed,size", CASES)
def test_engine_vs_oracle(spark, dataset, mode, seed, size):
    stream = STREAMS[dataset]
    gq = generate_query(stream, size, order_mode=mode, seed=seed)
    got, _ = spark_reported(spark, gq.query, stream, WINDOW)
    exp = oracle_reported(stream, gq.query, WINDOW)
    assert match_keyset(got, gq.query) == match_keyset(exp, gq.query)


@pytest.mark.parametrize("dataset,mode,seed,size", CASES[:3])
def test_engine_vs_pyengine(spark, dataset, mode, seed, size):
    """Three-way agreement: Spark batched == per-edge reference."""
    stream = STREAMS[dataset]
    gq = generate_query(stream, size, order_mode=mode, seed=seed)
    got, _ = spark_reported(spark, gq.query, stream, WINDOW)
    ref = PyTimingEngine(gq.query, WINDOW)
    exp = reports_to_frame(ref.run_serial(edges_from_pandas(stream)), gq.query)
    assert match_keyset(got, gq.query) == match_keyset(exp, gq.query)


def test_batch_size_invariance(spark):
    """DESIGN §3.3: reported matches are independent of micro-batch size."""
    stream = STREAMS["wikitalk"].head(120)
    gq = generate_query(stream, 4, order_mode="random", seed=1)
    results = {}
    for batch in (15, 60, 120):
        got, _ = spark_reported(spark, gq.query, stream, WINDOW, batch=batch)
        results[batch] = match_keyset(got, gq.query)
    assert results[15] == results[60] == results[120]
    assert results[15] == match_keyset(
        oracle_reported(stream, gq.query, WINDOW), gq.query
    )


def test_state_expires_with_window(spark):
    stream = STREAMS["netflow"]
    gq = generate_query(stream, 3, order_mode="empty", seed=5)
    eng = TimingEngine(spark, gq.query, 30)
    run_stream(eng, stream, 40)
    t_end = int(stream["ts"].iloc[-1])
    for items in eng.part_items:
        for item in items:
            if item.n:
                mins = [r["mn"] for r in item.df.select("mn").collect()]
                assert min(mins) > t_end - 30


def test_ind_engine_same_answers_more_space(spark):
    stream = STREAMS["wikitalk"]
    gq = generate_query(stream, 4, order_mode="random", seed=1)
    got_t, eng_t = spark_reported(spark, gq.query, stream, WINDOW)
    got_i, eng_i = spark_reported(
        spark, gq.query, stream, WINDOW, engine_cls=TimingIndEngine
    )
    assert match_keyset(got_t, gq.query) == match_keyset(got_i, gq.query)
    st, si = eng_t.space_sample(), eng_i.space_sample()
    assert st.ms_nodes <= si.ms_nodes
    assert si.ms_nodes == si.ind_cells


def test_single_tc_query_no_l0(spark):
    stream = STREAMS["netflow"]
    gq = generate_query(stream, 3, order_mode="full", seed=7)
    d = decompose(gq.query)
    if d.k != 1:
        pytest.skip("walk's timestamp order not prefix-connected")
    eng = TimingEngine(spark, gq.query, WINDOW, decomposition=d)
    assert eng.l0_items == []
    m = run_stream(eng, stream, 40)
    exp = oracle_reported(stream, gq.query, WINDOW)
    assert match_keyset(m.matches, gq.query) == match_keyset(exp, gq.query)


def test_non_chronological_batch_rejected(spark):
    stream = STREAMS["netflow"]
    gq = generate_query(stream, 3, order_mode="random", seed=0)
    eng = TimingEngine(spark, gq.query, WINDOW)
    eng.process_batch(stream.iloc[40:80])
    with pytest.raises(AssertionError, match="chronological"):
        eng.process_batch(stream.iloc[0:40])


def test_space_sample_accounting(spark):
    stream = STREAMS["wikitalk"]
    gq = generate_query(stream, 4, order_mode="random", seed=1)
    eng = TimingEngine(spark, gq.query, WINDOW)
    run_stream(eng, stream, 40)
    s = eng.space_sample()
    ms = sum(item.n for items in eng.part_items for item in items) + sum(
        item.n for item in eng.l0_items
    )
    assert s.ms_nodes == ms
    assert s.ind_cells >= s.ms_nodes
