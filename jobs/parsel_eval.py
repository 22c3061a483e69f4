"""Evaluate PARSEL: metric-heuristic pick vs simulated optimum for every
(algorithm, dataset, granularity) cell; regret 0 % = picked the winner.

Usage: python jobs/parsel_eval.py [--tier bench] [--out csv]
"""
import argparse

from _common import emit, get_spark

from repro.experiments.tables import parsel_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--tier", default="bench", choices=("test", "bench"))
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = get_spark("parsel_eval")
    t = parsel_table(spark, tier=args.tier)
    emit(t, args.out, title="PARSEL pick vs simulated best")
    print(
        f"\nmean regret: {t.regret_pct.mean():.2f}%  "
        f"exact picks: {(t.regret_pct == 0).mean() * 100:.0f}%"
    )
    spark.stop()


if __name__ == "__main__":
    main()
