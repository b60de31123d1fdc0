"""Shared benchmark plumbing: run a table builder once under pytest-benchmark.

Each benchmark reproduces one evaluation table (see DESIGN.md §5); the
benchmark measures the one full table build (rounds=1 — the table *is*
the experiment, its cells are themselves throughput measurements), and
the rows are printed + persisted under results/ for EXPERIMENTS.md.
"""
from __future__ import annotations


def build_table(benchmark, fn, *args, **kwargs):
    out = {}

    def run():
        out["df"] = fn(*args, **kwargs)
        return out["df"]

    benchmark.pedantic(run, rounds=1, iterations=1)
    df = out["df"]
    from repro.experiments.tables import to_markdown

    print("\n" + to_markdown(df))
    assert len(df) > 0
    return df
