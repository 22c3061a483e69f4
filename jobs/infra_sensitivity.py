"""Reproduce the §4 infrastructure experiment: PR on follow-dec under
configs (ii) 1 Gbps+HDD, (iii) 40 Gbps+HDD, (iv) 40 Gbps+SSD.
Paper reports −15 % / −20 % vs (ii).

Usage: python jobs/infra_sensitivity.py [--tier bench] [--out csv]
"""
import argparse

from _common import emit, get_spark

from repro.experiments.tables import infra_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--tier", default="bench", choices=("test", "bench"))
    ap.add_argument("--dataset", default="follow-dec")
    ap.add_argument("--strategy", default="2D")
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = get_spark("infra_sensitivity")
    t = infra_table(spark, tier=args.tier, dataset=args.dataset, strategy=args.strategy)
    emit(t, args.out, title=f"Infra sensitivity: PR on {args.dataset} ({args.strategy})")
    spark.stop()


if __name__ == "__main__":
    main()
