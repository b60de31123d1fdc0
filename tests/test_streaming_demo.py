"""End-to-end Structured Streaming demo: foreachBatch drives the engine."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "jobs"))


@pytest.mark.slow
def test_structured_streaming_matches_oracle(spark):
    from streaming_demo import run_demo

    n, oracle = run_demo(spark, n_edges=240, batch=60, window=60)
    assert n == oracle
