"""Structured Streaming execution of EMD Globalizer (Section III).

The paper's framework "facilitates continuous execution of a tweet
stream over multiple iterations. Each iteration consists of a batch of
incoming tweets". This module expresses that as a Spark Structured
Streaming job over a file source of tweet micro-batches:

- ``write_stream_batches`` materializes a generated dataset as ordered
  JSON micro-batch files with event timestamps (the Twitter API feed
  stand-in);
- ``StreamingGlobalizer`` advances the full pipeline inside
  ``foreachBatch``: Local EMD on the new batch, CTrie growth with new
  seed candidates, occurrence mining of the batch against all candidates
  known so far, incremental CandidateBase (sum, count) pooling, and
  re-classification — gamma (ambiguous) candidates gain evidence as new
  mentions arrive, exactly the paper's incremental design;
- ``windowed_mention_counts`` is the declarative windowed
  occurrence-mining view: event-time windows of per-candidate mention
  counts maintained by the engine.
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass, field
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.candidate_base import CandidateBase
from repro.core.ctrie import CTrie
from repro.core.mention_extraction import collect_local_embeddings, extract_mentions
from repro.core.pipeline import MAX_CANDIDATE_TOKENS, FittedVariant
from repro.core.tweetbase import TweetBase
from repro.streams.generator import TweetDataset

__all__ = [
    "write_stream_batches",
    "StreamingGlobalizer",
    "windowed_mention_counts",
    "STREAM_SCHEMA",
]

STREAM_SCHEMA = T.StructType(
    [
        T.StructField("tweet_id", T.LongType(), False),
        T.StructField("sent_id", T.IntegerType(), False),
        T.StructField("topic", T.IntegerType(), False),
        T.StructField("tokens", T.ArrayType(T.StringType()), False),
        T.StructField("ts", T.TimestampType(), False),
    ]
)


def write_stream_batches(
    dataset: TweetDataset,
    out_dir: str,
    *,
    n_batches: int = 4,
    start_ts: str = "2020-03-01T00:00:00",
    seconds_per_tweet: float = 1.0,
) -> list:
    """Write the dataset as ordered JSON micro-batch files with event
    timestamps; returns the file paths in arrival order."""
    os.makedirs(out_dir, exist_ok=True)
    t0 = pd.Timestamp(start_ts)
    pdf = dataset.tweets.reset_index(drop=True)
    paths = []
    per = int(np.ceil(len(pdf) / n_batches))
    for b in range(n_batches):
        chunk = pdf.iloc[b * per : (b + 1) * per]
        path = os.path.join(out_dir, f"batch-{b:04d}.json")
        with open(path, "w") as f:
            for i, r in chunk.iterrows():
                ts = t0 + pd.Timedelta(seconds=i * seconds_per_tweet)
                f.write(
                    json.dumps(
                        {
                            "tweet_id": int(r.tweet_id),
                            "sent_id": int(r.sent_id),
                            "topic": int(r.topic),
                            "tokens": list(r.tokens),
                            "ts": ts.isoformat(),
                        }
                    )
                    + "\n"
                )
        paths.append(path)
    return paths


@dataclass
class BatchOutput:
    """Per-micro-batch emission record."""

    batch_id: int
    n_tweets: int
    n_new_candidates: int
    mentions: pd.DataFrame  # entity-labelled mentions of this batch


@dataclass
class StreamingGlobalizer:
    """Driver-side incremental state + per-batch pipeline advance."""

    variant: FittedVariant
    ctrie: CTrie = field(default_factory=CTrie)
    candidate_base: CandidateBase | None = None
    tweet_base: TweetBase = field(default_factory=TweetBase)
    outputs: list = field(default_factory=list)

    def __post_init__(self):
        if self.candidate_base is None:
            self.candidate_base = CandidateBase(self.variant.emb_dim)

    def process_batch(
        self, spark: SparkSession, batch_df: DataFrame, batch_id: int
    ) -> BatchOutput:
        """One execution cycle (Section III steps 2–3) on a micro-batch."""
        v = self.variant
        batch_df = batch_df.select("tweet_id", "sent_id", "topic", "tokens").cache()
        try:
            n_tweets = batch_df.count()
            for r in batch_df.select("tweet_id", "sent_id", "tokens").collect():
                self.tweet_base.add_sentence(r.tweet_id, r.sent_id, list(r.tokens))
            # (2) Local EMD on the incoming batch -> new seed candidates
            local = v.system.tag(batch_df).toPandas()
            before = len(self.ctrie)
            for key in sorted(set(local["key"])):
                if 1 <= len(key.split(" ")) <= MAX_CANDIDATE_TOKENS:
                    self.ctrie.insert(key)
            n_new = len(self.ctrie) - before
            # (3i) scan the batch for mentions of *all* known candidates
            if len(self.ctrie) == 0:
                mentions = local.iloc[0:0]
                out = BatchOutput(batch_id, n_tweets, 0, mentions)
                self.outputs.append(out)
                return out
            mined_df = extract_mentions(spark, batch_df, self.ctrie)
            # (3ii) local candidate embeddings for each mention found
            embs = collect_local_embeddings(
                spark, batch_df, mined_df, v.system, v.phrase_embedder
            ).toPandas()
            # (3iii) incremental global pooling in the CandidateBase
            for r in embs.itertuples():
                self.candidate_base.add_mention(
                    r.key, np.asarray(r.emb, dtype=np.float64)
                )
                self.tweet_base.record_mention(
                    r.tweet_id, r.sent_id, r.start, r.length, r.key
                )
            # (3iv) re-classify every candidate on its updated pool
            self.candidate_base.classify_all(v.classifier)
            entity_keys = self.candidate_base.entity_keys()
            mentions = embs[embs["key"].isin(entity_keys)][
                ["tweet_id", "sent_id", "start", "length", "key", "surface"]
            ].reset_index(drop=True)
        finally:
            batch_df.unpersist()
        out = BatchOutput(batch_id, n_tweets, n_new, mentions)
        self.outputs.append(out)
        return out

    def all_output_mentions(self) -> pd.DataFrame:
        """Union of per-batch emissions (final stream output)."""
        frames = [o.mentions for o in self.outputs if len(o.mentions)]
        if not frames:
            return pd.DataFrame(
                columns=["tweet_id", "sent_id", "start", "length", "key", "surface"]
            )
        return pd.concat(frames, ignore_index=True)

    # ------------------------------------------------------------------
    def run_file_stream(
        self,
        spark: SparkSession,
        input_dir: str,
        *,
        max_files_per_trigger: int = 1,
        timeout_seconds: int = 300,
    ) -> None:
        """Consume a directory of micro-batch files with a Structured
        Streaming query whose ``foreachBatch`` advances this state."""

        def on_batch(batch_df: DataFrame, batch_id: int) -> None:
            if batch_df.rdd.isEmpty():
                return
            self.process_batch(spark, batch_df, int(batch_id))

        stream = (
            spark.readStream.schema(STREAM_SCHEMA)
            .option("maxFilesPerTrigger", max_files_per_trigger)
            .json(input_dir)
        )
        query = (
            stream.writeStream.foreachBatch(on_batch)
            .option("checkpointLocation", os.path.join(input_dir, "_checkpoint"))
            .trigger(availableNow=True)
            .start()
        )
        query.awaitTermination(timeout_seconds)


def windowed_mention_counts(
    stream_df: DataFrame,
    system,
    *,
    window_duration: str = "60 seconds",
    watermark: str = "120 seconds",
) -> DataFrame:
    """Declarative windowed occurrence mining: per-event-time-window
    per-candidate mention counts from Local EMD emissions.

    ``system`` is a *fitted* Local EMD system shipped in the closure;
    the result is a streaming aggregation suitable for a memory/console
    sink (or ``availableNow`` batch-equivalent runs in tests).
    """
    out_schema = T.StructType(
        [
            T.StructField("ts", T.TimestampType(), False),
            T.StructField("key", T.StringType(), False),
        ]
    )

    def tag(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        from repro.local_emd.base import is_special

        for pdf in batches:
            rows = []
            for r in pdf.itertuples():
                for start, length in system.tag_sentence(
                    list(r.tokens), int(r.tweet_id), int(r.sent_id)
                ):
                    span = list(r.tokens)[start : start + length]
                    if any(is_special(t) for t in span):
                        continue
                    rows.append((r.ts, " ".join(t.lower() for t in span)))
            yield pd.DataFrame(rows, columns=["ts", "key"])

    tagged = stream_df.mapInPandas(tag, schema=out_schema)
    return (
        tagged.withWatermark("ts", watermark)
        .groupBy(F.window("ts", window_duration), "key")
        .agg(F.count("*").alias("n_mentions"))
    )
