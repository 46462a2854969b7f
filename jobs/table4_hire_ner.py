"""Table IV — EMD Globalizer (Aguilar-instantiated) vs HIRE-NER.

Usage: ``spark-submit jobs/table4_hire_ner.py [--scale S] [--d5-scale S]``
"""
from __future__ import annotations

import argparse

from _session import get_spark

from repro.eval.experiments import fitted_variants, run_table4


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--d5-scale", type=float, default=0.2)
    ap.add_argument("--datasets", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("table4")
    datasets = args.datasets.split(",") if args.datasets else None
    variants = fitted_variants(
        spark, systems=["Aguilar et al."], scale=args.scale, d5_scale=args.d5_scale
    )
    table = run_table4(
        spark, variants["Aguilar et al."], datasets=datasets, scale=args.scale
    )
    print("\n== Table IV: Global EMD systems (measured vs paper) ==")
    print(table.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
