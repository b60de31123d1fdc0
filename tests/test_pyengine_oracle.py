"""Per-edge reference engine vs the DuckDB golden oracle (Def 4 semantics).

The big correctness matrix: datasets × seeds × order modes × query sizes,
MS-tree and IND stores — every reported match set must equal the SQL
definition of time-constrained subgraph matching over the stream.
"""
import pandas as pd
import pytest

from repro.core.pyengine import PyTimingEngine, edges_from_pandas
from repro.datagen.queries import generate_query
from repro.datagen.streams import netflow_stream, social_stream, wikitalk_stream

from .util import match_keyset, oracle_reported, reports_to_frame

STREAMS = {
    "netflow": netflow_stream(350, n_ips=60, seed=0),
    "wikitalk": wikitalk_stream(350, n_users=45, seed=1),
    "social": social_stream(350, n_users=50, seed=2),
}
WINDOW = 110


def run_case(dataset, size, mode, seed, use_mstree=True, window=WINDOW):
    stream = STREAMS[dataset]
    gq = generate_query(stream, size, order_mode=mode, seed=seed)
    eng = PyTimingEngine(gq.query, window, use_mstree=use_mstree)
    reports = eng.run_serial(edges_from_pandas(stream))
    got = reports_to_frame(reports, gq.query)
    exp = oracle_reported(stream, gq.query, window)
    return gq.query, got, exp, eng


@pytest.mark.parametrize("dataset", sorted(STREAMS))
@pytest.mark.parametrize("mode", ["random", "full", "empty"])
@pytest.mark.parametrize("seed", range(5))
def test_size3_matrix(dataset, mode, seed):
    q, got, exp, _ = run_case(dataset, 3, mode, seed)
    assert match_keyset(got, q) == match_keyset(exp, q)


@pytest.mark.parametrize("dataset", sorted(STREAMS))
@pytest.mark.parametrize("mode", ["random", "full", "empty"])
@pytest.mark.parametrize("seed", range(3))
def test_size5_matrix(dataset, mode, seed):
    q, got, exp, _ = run_case(dataset, 5, mode, seed + 10)
    assert match_keyset(got, q) == match_keyset(exp, q)


@pytest.mark.parametrize("dataset", sorted(STREAMS))
@pytest.mark.parametrize("seed", range(2))
def test_size7_random(dataset, seed):
    q, got, exp, _ = run_case(dataset, 7, "random", seed + 20)
    assert match_keyset(got, q) == match_keyset(exp, q)


@pytest.mark.parametrize("window", [40, 90, 200])
@pytest.mark.parametrize("seed", [1, 3])
def test_window_sensitivity(window, seed):
    """Bigger windows can only grow the reported-match set (monotone)."""
    q, got, exp, _ = run_case("wikitalk", 4, "random", seed, window=window)
    assert match_keyset(got, q) == match_keyset(exp, q)


@pytest.mark.parametrize("dataset", sorted(STREAMS))
@pytest.mark.parametrize("mode", ["random", "empty"])
@pytest.mark.parametrize("seed", [0, 2])
def test_ind_store_agrees(dataset, mode, seed):
    """The IND store is semantically identical to the MS-tree store."""
    q, got_ms, exp, eng_ms = run_case(dataset, 4, mode, seed)
    q2, got_ind, _, eng_ind = run_case(dataset, 4, mode, seed, use_mstree=False)
    assert match_keyset(got_ms, q) == match_keyset(exp, q)
    assert match_keyset(got_ind, q) == match_keyset(got_ms, q)


@pytest.mark.parametrize("seed", [1, 3, 4])
def test_mstree_space_never_worse(seed):
    """Σ|Lʲ| nodes (MS-tree) ≤ Σ j·|Lʲ| cells (IND) at end of stream."""
    _, _, _, eng_ms = run_case("wikitalk", 4, "random", seed)
    _, _, _, eng_ind = run_case("wikitalk", 4, "random", seed, use_mstree=False)
    assert eng_ms.space_nodes() <= eng_ind.space_nodes()


def test_window_monotonicity_of_answers():
    stream = STREAMS["wikitalk"]
    gq = generate_query(stream, 4, order_mode="random", seed=1)
    counts = []
    for window in (40, 90, 200):
        eng = PyTimingEngine(gq.query, window)
        counts.append(len(eng.run_serial(edges_from_pandas(stream))))
    assert counts == sorted(counts)


def test_expired_matches_leave_state():
    """After the stream ends, stored partials only cover the last window."""
    stream = STREAMS["netflow"]
    gq = generate_query(stream, 3, order_mode="empty", seed=5)
    eng = PyTimingEngine(gq.query, 50)
    eng.run_serial(edges_from_pandas(stream))
    t_end = int(stream["ts"].iloc[-1])
    for i, seq in enumerate(eng.parts):
        for lv in range(1, len(seq) + 1):
            for match, _ in eng._read_part(i, lv):
                assert min(e.ts for e in match) > t_end - 50


def test_edge_matching_labels():
    stream = STREAMS["social"]
    gq = generate_query(stream, 3, order_mode="random", seed=3)
    eng = PyTimingEngine(gq.query, 100)
    for e in edges_from_pandas(stream.head(50)):
        for qe in range(gq.query.n_edges):
            if eng.edge_matches(e, qe):
                q = gq.query.edges[qe]
                assert gq.query.vlabels[q.src] == e.slabel
                assert gq.query.vlabels[q.dst] == e.dlabel
                if q.elabel is not None:
                    assert q.elabel == e.elabel
