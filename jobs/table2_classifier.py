"""Table II — Entity Classifier validation performance per variant.

Builds all four framework variants (fitting each Local EMD system,
training phrase embedders for the deep ones, and training each Entity
Classifier on the D5 candidate stream) and prints validation F1 next to
the paper's numbers, plus the phrase-embedder validation losses
(paper: 0.185 Aguilar / 0.167 BERTweet).

Usage: ``spark-submit jobs/table2_classifier.py [--scale S] [--d5-scale S]``
"""
from __future__ import annotations

import argparse

from _session import get_spark

from repro.eval.experiments import fitted_variants, run_table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--d5-scale", type=float, default=0.2)
    args = ap.parse_args()
    spark = get_spark("table2")
    variants = fitted_variants(spark, scale=args.scale, d5_scale=args.d5_scale)
    print("\n== Table II: Entity Classifier validation F1 (measured vs paper) ==")
    print(run_table2(variants).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
