"""Figure 6 (as text) — component ablation on the streaming datasets.

Local-only vs +mention-extraction vs full framework, Aguilar et al.
instantiation (the paper's choice: its best local performer).
Paper text: mention extraction alone gives ~5.06% average gain; the
full framework gives ~15.36% for Aguilar on D1-D4.

Usage: ``spark-submit jobs/ablation_components.py [--scale S] [--d5-scale S]``
"""
from __future__ import annotations

import argparse

from _session import get_spark

from repro.eval.experiments import fitted_variants, run_ablation


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--d5-scale", type=float, default=0.2)
    args = ap.parse_args()
    spark = get_spark("ablation")
    variants = fitted_variants(
        spark, systems=["Aguilar et al."], scale=args.scale, d5_scale=args.d5_scale
    )
    table = run_ablation(spark, variants["Aguilar et al."], scale=args.scale)
    print("\n== Figure 6 (text): component ablation, Aguilar et al. ==")
    print(table.to_string(index=False))
    base = table["F1_local"].mean()
    print(f"\nmention-extraction gain: {100 * (table['F1_mining'].mean() - base) / base:.1f}% (paper ~5.06%)")
    print(f"full-framework gain:     {100 * (table['F1_full'].mean() - base) / base:.1f}% (paper ~15.36%)")
    spark.stop()


if __name__ == "__main__":
    main()
