"""§VII-F case study: detect the Fig 1 ZeuS-style exfiltration pattern.

The paper monitors the Fig 1 query over real traffic and catches the
compromise when the 5-step chain completes inside a 30 s window; here
the chain is planted in synthetic traffic (DESIGN.md §2) and the engine
must report exactly the planted occurrences — label noise alone (attack
step labels sprinkled on random background edges) must not fire.
"""
import pytest

from repro.core.pyengine import PyTimingEngine, edges_from_pandas
from repro.datagen.streams import attack_query, attack_trace
from repro.decompose import decompose

WINDOW = 40  # "30 seconds, long enough for an attack of such pattern"


class TestAttackQuery:
    def test_is_tc_query(self):
        """Fig 1's full timing order makes the pattern a single TC-query."""
        q = attack_query()
        assert q.is_tc_query()
        assert decompose(q).k == 1

    def test_timing_sequence_is_attack_order(self):
        assert attack_query().timing_sequence() == [0, 1, 2, 3, 4]


@pytest.mark.parametrize("n_attacks", [1, 2, 3])
def test_detects_each_planted_attack(n_attacks):
    trace = attack_trace(1200, n_attacks=n_attacks, seed=11)
    eng = PyTimingEngine(attack_query(), WINDOW)
    reports = eng.run_serial(edges_from_pandas(trace))
    assert len(reports) == n_attacks
    victims = sorted({r["v0"] for r in reports})
    assert victims == [150 + 3 * a for a in range(n_attacks)]
    for r in reports:
        assert r["t0"] < r["t1"] < r["t2"] < r["t3"] < r["t4"]


def test_no_detection_when_window_too_small():
    """If the window cannot span the chain, the attack is not reported."""
    trace = attack_trace(1200, n_attacks=1, attack_span=30, seed=11)
    eng = PyTimingEngine(attack_query(), 3)
    assert eng.run_serial(edges_from_pandas(trace)) == []


def test_background_noise_alone_never_fires():
    trace = attack_trace(1200, n_attacks=0, seed=13)
    eng = PyTimingEngine(attack_query(), WINDOW)
    assert eng.run_serial(edges_from_pandas(trace)) == []
