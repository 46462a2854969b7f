"""Experiment harness: run a framework variant over a dataset and emit
one Table III row (local P/R/F1/time, global P/R/F1/time, gain, overhead).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from repro.core.pipeline import EMDGlobalizer, FittedVariant
from repro.eval.metrics import PRF, score_mentions
from repro.streams.generator import TweetDataset

__all__ = ["TableIIIRow", "evaluate_variant"]


@dataclass
class TableIIIRow:
    """Measured counterpart of one Table III row."""

    dataset: str
    system: str
    local: PRF
    global_: PRF
    local_seconds: float
    global_seconds: float

    @property
    def f1_gain_pct(self) -> float:
        if self.local.f1 == 0:
            return float("inf")
        return 100.0 * (self.global_.f1 - self.local.f1) / self.local.f1

    @property
    def total_seconds(self) -> float:
        return self.local_seconds + self.global_seconds

    def row(self) -> dict:
        return {
            "dataset": self.dataset,
            "system": self.system,
            "local_P": round(self.local.precision, 3),
            "local_R": round(self.local.recall, 3),
            "local_F1": round(self.local.f1, 3),
            "local_time_s": round(self.local_seconds, 2),
            "global_P": round(self.global_.precision, 3),
            "global_R": round(self.global_.recall, 3),
            "global_F1": round(self.global_.f1, 3),
            "total_time_s": round(self.total_seconds, 2),
            "f1_gain_pct": round(self.f1_gain_pct, 1),
            "time_overhead_s": round(self.global_seconds, 2),
        }


def evaluate_variant(
    spark: SparkSession,
    variant: FittedVariant,
    dataset: TweetDataset,
    *,
    ablation: str = "full",
) -> TableIIIRow:
    """Run one (system, dataset) cell and score local vs global output."""
    tweets_df = dataset.to_spark(spark).cache()
    try:
        result = EMDGlobalizer(variant).run(spark, tweets_df, ablation=ablation)
    finally:
        tweets_df.unpersist()
    local_prf = score_mentions(result.local_mentions, dataset.gold)
    global_prf = score_mentions(result.final_mentions, dataset.gold)
    return TableIIIRow(
        dataset.name,
        variant.system.name,
        local_prf,
        global_prf,
        result.local_seconds,
        result.global_seconds,
    )
