"""Wall-clock spot-check: run the real algorithms on locally-placed
partitionings and report seconds per (dataset, strategy). Sanity-checks
that actual Spark shuffle work tracks the simulator's ordering
(DESIGN.md substitution #3).

Usage: python jobs/wallclock_spotcheck.py [--algo pr] [--datasets pocek]
       [--strategies RVC,2D,DC] [--parts 16] [--tier test] [--out csv]
"""
import argparse

import pandas as pd
from _common import emit, get_spark

from repro.experiments.wallclock import prepare, run_algo
from repro.graphgen.datasets import load


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--algo", default="pr", choices=("pr", "cc", "tr", "sssp"))
    ap.add_argument("--datasets", default="pocek")
    ap.add_argument("--strategies", default="RVC,2D,DC")
    ap.add_argument("--parts", type=int, default=16)
    ap.add_argument("--tier", default="test", choices=("test", "bench"))
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = get_spark(f"wallclock_{args.algo}")
    rows = []
    for name in args.datasets.split(","):
        edges = load(spark, name, args.tier).localCheckpoint(eager=True)
        for s in args.strategies.split(","):
            ep = prepare(edges, s, args.parts)
            secs = run_algo(ep, args.algo)
            rows.append(dict(dataset=name, strategy=s, algo=args.algo, seconds=round(secs, 2)))
    emit(pd.DataFrame(rows), args.out, title=f"Wall-clock {args.algo} (tier={args.tier})")
    spark.stop()


if __name__ == "__main__":
    main()
