"""Stream generators (Def 1 invariants) and §VII-B query generation."""
import pandas as pd
import pytest

from repro.datagen.queries import generate_query, generate_query_with_k, queryset
from repro.datagen.streams import (
    EDGE_COLS,
    attack_trace,
    netflow_stream,
    social_stream,
    wikitalk_stream,
)
from repro.decompose import decompose

GENS = {
    "netflow": netflow_stream,
    "wikitalk": wikitalk_stream,
    "social": social_stream,
}


@pytest.mark.parametrize("name", sorted(GENS))
class TestStreamInvariants:
    def test_columns(self, name):
        s = GENS[name](300, seed=0)
        assert list(s.columns) == EDGE_COLS

    def test_strictly_increasing_unique_timestamps(self, name):
        s = GENS[name](300, seed=0)
        assert s["ts"].is_monotonic_increasing
        assert s["ts"].is_unique

    def test_deterministic_in_seed(self, name):
        a, b = GENS[name](200, seed=5), GENS[name](200, seed=5)
        pd.testing.assert_frame_equal(a, b)
        c = GENS[name](200, seed=6)
        assert not a.equals(c)

    def test_vertex_labels_consistent(self, name):
        """Def 1: a vertex keeps one label for its lifetime."""
        s = GENS[name](400, seed=1)
        lab = {}
        for _, r in s.iterrows():
            for v, l in ((r["src"], r["slabel"]), (r["dst"], r["dlabel"])):
                assert lab.setdefault(v, l) == l

    def test_no_self_loops(self, name):
        s = GENS[name](400, seed=2)
        assert (s["src"] != s["dst"]).all()


class TestNetflowSkew:
    def test_top_ports_dominate(self):
        """§VII-A: the few most frequent destination ports cover ~half."""
        s = netflow_stream(4000, seed=0)
        ports = s["elabel"].str.split("|").str[1]
        top = ports.value_counts().head(6).sum()
        assert top / len(s) > 0.45
        # …while the tail is long (many distinct, rare ports)
        assert ports.nunique() > 50


class TestQueryGeneration:
    @pytest.mark.parametrize("name", sorted(GENS))
    @pytest.mark.parametrize("size", [3, 6, 9])
    def test_structure(self, name, size):
        stream = GENS[name](500, seed=0)
        gq = generate_query(stream, size, order_mode="random", seed=1)
        assert gq.query.n_edges == size
        # weak connectivity is enforced by the QueryGraph constructor

    @pytest.mark.parametrize("mode", ["random", "full", "empty"])
    def test_embedding_satisfies_order(self, mode):
        """The walk itself is a valid time-constrained embedding (§VII-B)."""
        stream = wikitalk_stream(500, seed=0)
        gq = generate_query(stream, 5, order_mode=mode, seed=2)
        ts = dict(zip(stream["eid"], stream["ts"]))
        walk_ts = [ts[e] for e in gq.walk_eids]
        for a, b in gq.query.order:
            assert walk_ts[a] < walk_ts[b]

    def test_full_order_is_total(self):
        stream = wikitalk_stream(500, seed=0)
        gq = generate_query(stream, 4, order_mode="full", seed=3)
        m = gq.query.n_edges
        assert len(gq.query.order) == m * (m - 1) // 2

    def test_empty_order(self):
        stream = wikitalk_stream(500, seed=0)
        gq = generate_query(stream, 4, order_mode="empty", seed=3)
        assert len(gq.query.order) == 0

    @pytest.mark.parametrize("k", [1, 2, 4, 6])
    def test_k_targeted(self, k):
        stream = wikitalk_stream(800, seed=0)
        gq = generate_query_with_k(stream, 6, k, seed=4)
        assert decompose(gq.query).k == k

    def test_queryset_shape(self):
        stream = wikitalk_stream(500, seed=0)
        qs = queryset(stream, [3, 5], n_structures=2)
        assert len(qs) == 2 * 2 * 3
        assert {g.order_mode for g in qs} == {"full", "empty", "random"}


class TestAttackTrace:
    def test_planted_chain_present(self):
        trace = attack_trace(600, n_attacks=2, seed=7)
        assert trace["ts"].is_unique and trace["ts"].is_monotonic_increasing
        for a in range(2):
            victim = 150 + 3 * a
            steps = trace[(trace["src"] == victim) | (trace["dst"] == victim)]
            labels = list(steps["elabel"])
            for step in ("browse", "malware", "register", "command", "exfiltrate"):
                assert step in labels
