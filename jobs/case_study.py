#!/usr/bin/env python
"""§VII-F case study (Fig 22): detect the Fig 1 exfiltration chain.

Plants ZeuS-style attack chains in synthetic traffic and runs the Spark
Timing engine with the Fig 1 query; prints every detected attack with
its edge timestamps (the Fig 22 analog).

Usage: spark-submit jobs/case_study.py [--attacks N] [--edges N]
"""
from __future__ import annotations

import argparse
import sys


def main(argv=None) -> int:
    parser = argparse.ArgumentParser(description=__doc__)
    parser.add_argument("--attacks", type=int, default=2)
    parser.add_argument("--edges", type=int, default=1500)
    parser.add_argument("--window", type=int, default=40)
    args = parser.parse_args(argv)

    from repro.core.engine import TimingEngine
    from repro.datagen.streams import ATTACK_STEPS, attack_query, attack_trace
    from repro.experiments.harness import run_stream

    from run_table import get_spark

    spark = get_spark()
    trace = attack_trace(args.edges, n_attacks=args.attacks, seed=11)
    engine = TimingEngine(spark, attack_query(), args.window)
    metrics = run_stream(engine, trace, batch_size=200)
    print(f"stream edges={len(trace)}  window={args.window}  "
          f"detected={metrics.n_matches} (planted {args.attacks})")
    for _, m in metrics.matches.iterrows():
        steps = "  ".join(
            f"{name}@t{int(m[f't{i}'])}" for i, name in enumerate(ATTACK_STEPS)
        )
        print(f"victim={int(m['v0'])} website={int(m['v1'])} "
              f"cnc={int(m['v2'])}: {steps}")
    return 0 if metrics.n_matches == args.attacks else 1


if __name__ == "__main__":
    sys.exit(main())
