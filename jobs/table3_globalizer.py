"""Table III — effectiveness and execution time with EMD Globalizer.

The paper's main experiment: 6 datasets x 4 Local EMD instantiations,
local P/R/F1/time vs global P/R/F1/time, F1 gain and time overhead.
Prints measured rows with the paper's F1/gain columns inline, then the
per-system and streaming/non-streaming average gains quoted in the text
(25.61% overall, 30.29% streaming, 15.53% non-streaming).

Usage: ``spark-submit jobs/table3_globalizer.py [--scale S] [--d5-scale S]
[--systems "NP Chunker,BERTweet"] [--datasets d1,d2]``
"""
from __future__ import annotations

import argparse

from _session import get_spark

from repro.eval.experiments import fitted_variants, run_table3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--d5-scale", type=float, default=0.2)
    ap.add_argument("--systems", type=str, default=None)
    ap.add_argument("--datasets", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("table3")
    systems = args.systems.split(",") if args.systems else None
    datasets = args.datasets.split(",") if args.datasets else None
    variants = fitted_variants(
        spark, systems=systems, scale=args.scale, d5_scale=args.d5_scale
    )
    table = run_table3(spark, variants, datasets=datasets, scale=args.scale)
    print("\n== Table III: Local vs Global EMD (measured vs paper) ==")
    print(table.to_string(index=False))

    streaming = table[table["dataset"].isin(["d1", "d2", "d3", "d4"])]
    nonstreaming = table[table["dataset"].isin(["wnut17", "btc"])]
    print("\n-- average F1 gain % (paper in parentheses) --")
    print(f"overall: {table['f1_gain_pct'].mean():.1f} (25.61)")
    if len(streaming):
        print(f"streaming d1-d4: {streaming['f1_gain_pct'].mean():.1f} (30.29)")
    if len(nonstreaming):
        print(f"non-streaming: {nonstreaming['f1_gain_pct'].mean():.1f} (15.53)")
    for sys_name, grp in table.groupby("system"):
        print(f"{sys_name}: {grp['f1_gain_pct'].mean():.1f}")
    spark.stop()


if __name__ == "__main__":
    main()
