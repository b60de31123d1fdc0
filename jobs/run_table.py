#!/usr/bin/env python
"""spark-submit entrypoint: reproduce one evaluation table (T15…T25).

Usage:
    spark-submit jobs/run_table.py --table T15
    python jobs/run_table.py --table T25        # non-Spark tables work too

Writes the table to results/<name>.md and prints it.
"""
from __future__ import annotations

import argparse
import sys


def get_spark():
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("repro-tables")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def main(argv=None) -> int:
    from repro.experiments import tables as T

    parser = argparse.ArgumentParser(description=__doc__)
    parser.add_argument(
        "--table",
        required=True,
        choices=[
            "T15", "T16", "T17", "T18", "T19", "T20", "T21", "T23", "T24", "T25",
        ],
    )
    args = parser.parse_args(argv)
    spark_tables = {
        "T15": T.t15_throughput_vs_window,
        "T16": T.t16_throughput_vs_qsize,
        "T17": T.t17_space_vs_window,
        "T18": T.t18_space_vs_qsize,
        "T21": T.t21_optimizations,
        "T23": T.t23_throughput_vs_k,
        "T24": T.t24_space_vs_k,
    }
    py_tables = {
        "T19": T.t19_speedup_vs_window,
        "T20": T.t20_speedup_vs_qsize,
        "T25": T.t25_selectivity,
    }
    if args.table in py_tables:
        df = py_tables[args.table]()
    else:
        df = spark_tables[args.table](get_spark())
    print(df.to_markdown(index=False))
    return 0


if __name__ == "__main__":
    sys.exit(main())
