"""Table I — dataset statistics of the generated corpora.

Usage: ``spark-submit jobs/table1_datasets.py [--scale S]``
(No Spark computation is strictly needed for the stats; the job also
round-trips each corpus through a Spark DataFrame to validate schemas.)
"""
from __future__ import annotations

import argparse

from _session import get_spark

from repro.eval.experiments import run_table1
from repro.streams import generator as gen


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = get_spark("table1")
    table = run_table1(scale=args.scale)
    # schema validation round-trip
    for name in table["dataset"]:
        df = gen.generate(name, scale=min(args.scale, 0.05)).to_spark(spark)
        assert df.count() > 0
    print("\n== Table I: Twitter datasets (generated vs paper) ==")
    print(table.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
