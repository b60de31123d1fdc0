#!/usr/bin/env python
"""Structured Streaming wrapper: file source → foreachBatch → TimingEngine.

The micro-batch engine (DESIGN.md §3.3) is exactly a ``foreachBatch``
consumer; this job demonstrates it end-to-end with a real Structured
Streaming query. The stream is staged as one JSON file per micro-batch
(lexicographic names, maxFilesPerTrigger=1, so Structured Streaming
delivers them chronologically) and drained with ``availableNow``.

Usage: spark-submit jobs/streaming_demo.py [--edges N] [--batch N]
"""
from __future__ import annotations

import argparse
import sys
import tempfile
from pathlib import Path


def stage_stream(stream, batch: int, directory: Path) -> None:
    for i, s in enumerate(range(0, len(stream), batch)):
        stream.iloc[s : s + batch].to_json(
            directory / f"{i:06d}.json", orient="records", lines=True
        )


def run_demo(spark, n_edges: int = 600, batch: int = 100, window: int = 80):
    """Returns (n_reported, oracle_count) for the demo query."""
    from repro.core.engine import TimingEngine
    from repro.core.matcher import EDGE_SCHEMA
    from repro.core.sqlgen import reported_matches_sql
    from repro.datagen.queries import generate_query
    from repro.datagen.streams import wikitalk_stream

    stream = wikitalk_stream(n_edges, seed=1)
    gq = generate_query(stream, 4, order_mode="random", seed=1)
    engine = TimingEngine(spark, gq.query, window)

    reported = []

    def handle(batch_df, batch_id: int) -> None:
        pdf = batch_df.orderBy("ts").toPandas()
        if len(pdf):
            reported.append(engine.process_batch(pdf).matches)

    with tempfile.TemporaryDirectory() as d:
        stage_stream(stream, batch, Path(d))
        q = (
            spark.readStream.schema(EDGE_SCHEMA)
            .option("maxFilesPerTrigger", 1)
            .json(d)
            .writeStream.foreachBatch(handle)
            .trigger(availableNow=True)
            .start()
        )
        q.awaitTermination()

    import duckdb

    con = duckdb.connect()
    con.register("edges", stream)
    oracle = len(con.execute(reported_matches_sql(gq.query, window)).fetchdf())
    con.close()
    n = sum(len(f) for f in reported)
    return n, oracle


def main(argv=None) -> int:
    parser = argparse.ArgumentParser(description=__doc__)
    parser.add_argument("--edges", type=int, default=600)
    parser.add_argument("--batch", type=int, default=100)
    parser.add_argument("--window", type=int, default=80)
    args = parser.parse_args(argv)
    from run_table import get_spark

    n, oracle = run_demo(get_spark(), args.edges, args.batch, args.window)
    print(f"structured-streaming reported {n} matches; oracle says {oracle}")
    return 0 if n == oracle else 1


if __name__ == "__main__":
    sys.exit(main())
