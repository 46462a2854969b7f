"""Section VI-C (as text) — error analysis of the BERTweet variant.

Reports, over the streaming datasets: mentions/entities lost because
Local EMD missed every mention (paper: 3008 mentions, 26.35%, of 1018
entities), mentions lost to Entity-Classifier false negatives (paper:
469 mentions, 4.1%, 81 entities), and classifier recall by
mention-frequency bin (Figure 7; paper: ~56% for <=5 mentions, rising
quickly with frequency).

Usage: ``spark-submit jobs/error_analysis.py [--scale S] [--d5-scale S]``
"""
from __future__ import annotations

import argparse
import json

from _session import get_spark

from repro.eval.experiments import fitted_variants, run_error_analysis


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--d5-scale", type=float, default=0.2)
    args = ap.parse_args()
    spark = get_spark("error-analysis")
    variants = fitted_variants(
        spark, systems=["BERTweet"], scale=args.scale, d5_scale=args.d5_scale
    )
    stats = run_error_analysis(spark, variants["BERTweet"], scale=args.scale)
    print("\n== Section VI-C: error analysis, BERTweet variant ==")
    print(json.dumps(stats, indent=2))
    spark.stop()


if __name__ == "__main__":
    main()
