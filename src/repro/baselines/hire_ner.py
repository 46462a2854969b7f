"""HIRE-NER baseline (Luo et al., AAAI 2020) — the Table IV comparator.

HIRE-NER performs document-level EMD: for every unique token it distills
non-local information from the whole document into a memory structure,
appends the pooled global token representation to each sentence-level
local embedding, and decodes token labels from the concatenation. The
paper uses it as the representative "globalize at token level" design,
against which EMD Globalizer's "globalize only entity candidates" is
shown to yield higher precision (token-level global features inject
noise into the decoder's inference).

This reproduction keeps exactly that architecture over the same
substrate as the Aguilar et al. stand-in (both BiLSTM architectures in
the paper; both MLPs over the same synthetic contextual bank here):

- local features: contextual token embedding + surface features (+ the
  same gazetteer lexical features),
- global features: the *corpus-level mean* of the token's contextual
  embeddings (the memory structure), recomputed for whatever dataset is
  being processed — "HIRE-NER treats messages in a stream as composite
  content, much like a document",
- decoder: feed-forward O/B/I head over [local ‖ global].

The token-type pooling runs as Spark dataflow: explode tokens, compute
per-type mean embeddings, broadcast back into the tagging pass.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.local_emd.base import (
    MENTIONS_SCHEMA,
    bio_to_spans,
    is_special,
    spans_to_bio,
    surface_features,
)
from repro.local_emd.deep import gazetteer_features, train_bio_tagger
from repro.local_emd.embeddings import EmbeddingBank
from repro.nn.mlp import MLP

__all__ = ["HireNER"]


class HireNER:
    """Document-level EMD with token-type global memory features."""

    name = "HIRE-NER"

    def __init__(
        self,
        bank: EmbeddingBank,
        gazetteer_keys: set,
        *,
        hidden: tuple = (128, 100),
        seed: int = 47,
        epochs: int = 14,
    ):
        self.bank = bank
        self.gaz_uni = {k for k in gazetteer_keys if " " not in k}
        self.gaz_tokens = {t for k in gazetteer_keys for t in k.split(" ")}
        self.hidden = list(hidden)
        self.seed = seed
        self.epochs = epochs
        self.model: MLP | None = None

    @property
    def n_local_features(self) -> int:
        return self.bank.dim + 9 + 2

    @property
    def n_features(self) -> int:
        return self.n_local_features + self.bank.dim  # + global memory slot

    # ------------------------------------------------------------------
    def _memory(self, tweets: pd.DataFrame) -> dict:
        """The memory structure: mean contextual embedding per token type
        over the whole corpus (document)."""
        sums: dict = {}
        counts: dict = {}
        for r in tweets.itertuples():
            toks = [t.lower() for t in r.tokens]
            emb = self.bank.contextual(toks, int(r.tweet_id), int(r.sent_id))
            for t, e in zip(toks, emb):
                if t in sums:
                    sums[t] += e
                    counts[t] += 1
                else:
                    sums[t] = e.astype(np.float64).copy()
                    counts[t] = 1
        return {t: (sums[t] / counts[t]).astype(np.float32) for t in sums}

    def _features(
        self, tokens: list, tweet_id: int, sent_id: int, memory: dict
    ) -> np.ndarray:
        low = [t.lower() for t in tokens]
        emb = self.bank.contextual(low, tweet_id, sent_id)
        glob = np.stack([memory[t] for t in low]) if tokens else emb
        return np.concatenate(
            [
                emb,
                surface_features(tokens),
                gazetteer_features(tokens, self.gaz_uni, self.gaz_tokens),
                glob,
            ],
            axis=1,
        )

    def fit(self, train_tweets: pd.DataFrame, train_gold: pd.DataFrame) -> None:
        memory = self._memory(train_tweets)
        gold_by_sent: dict = {}
        for r in train_gold.itertuples():
            gold_by_sent.setdefault((r.tweet_id, r.sent_id), []).append(
                (r.start, r.length)
            )
        Xs, Ys = [], []
        for r in train_tweets.itertuples():
            toks = list(r.tokens)
            Xs.append(self._features(toks, int(r.tweet_id), int(r.sent_id), memory))
            tags = spans_to_bio(len(toks), gold_by_sent.get((r.tweet_id, r.sent_id), []))
            Y = np.zeros((len(toks), 3), dtype=np.float32)
            Y[np.arange(len(toks)), tags] = 1.0
            Ys.append(Y)
        X = np.concatenate(Xs).astype(np.float32)
        Y = np.concatenate(Ys).astype(np.float32)
        sizes = [self.n_features, *self.hidden, 3]
        acts = ["relu"] * len(self.hidden) + ["sigmoid"]
        self.model = MLP.build(sizes, acts, seed=self.seed)
        train_bio_tagger(self.model, X, Y, epochs=self.epochs, seed=self.seed)

    # ------------------------------------------------------------------
    def build_memory(self, spark: SparkSession, tweets_df: DataFrame) -> dict:
        """Compute the per-token-type global memory for a dataset as a
        distributed (sum, count) aggregation over partitions."""
        bank = self.bank

        def partial(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            for pdf in batches:
                sums: dict = {}
                counts: dict = {}
                for r in pdf.itertuples():
                    toks = [t.lower() for t in r.tokens]
                    emb = bank.contextual(toks, int(r.tweet_id), int(r.sent_id))
                    for t, e in zip(toks, emb):
                        if t in sums:
                            sums[t] += e
                            counts[t] += 1
                        else:
                            sums[t] = e.astype(np.float64).copy()
                            counts[t] = 1
                yield pd.DataFrame(
                    {
                        "token": list(sums),
                        "emb_sum": [sums[t].tolist() for t in sums],
                        "count": [counts[t] for t in sums],
                    }
                )

        import pyspark.sql.types as T

        schema = T.StructType(
            [
                T.StructField("token", T.StringType()),
                T.StructField("emb_sum", T.ArrayType(T.DoubleType())),
                T.StructField("count", T.LongType()),
            ]
        )
        partials = tweets_df.mapInPandas(partial, schema=schema).toPandas()
        memory: dict = {}
        counts: dict = {}
        for r in partials.itertuples():
            v = np.asarray(r.emb_sum)
            if r.token in memory:
                memory[r.token] += v
                counts[r.token] += r.count
            else:
                memory[r.token] = v.copy()
                counts[r.token] = r.count
        return {t: (memory[t] / counts[t]).astype(np.float32) for t in memory}

    def tag(self, spark: SparkSession, tweets_df: DataFrame) -> DataFrame:
        """Two-pass document EMD: build the global memory over the whole
        dataset, then decode every sentence with [local ‖ global]."""
        if self.model is None:
            raise RuntimeError("HireNER: call fit() first")
        memory = self.build_memory(spark, tweets_df)
        bc = spark.sparkContext.broadcast((self.model.to_arrays(), memory))
        me = self

        def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            arrays, mem = bc.value
            model = MLP.from_arrays(arrays)
            for pdf in batches:
                rows = []
                for r in pdf.itertuples():
                    toks = list(r.tokens)
                    if not toks:
                        continue
                    X = me._features(toks, int(r.tweet_id), int(r.sent_id), mem)
                    p = model.forward(X)
                    for start, length in bio_to_spans(np.argmax(p, axis=1)):
                        span = toks[start : start + length]
                        if any(is_special(t) for t in span):
                            continue
                        rows.append(
                            (
                                int(r.tweet_id),
                                int(r.sent_id),
                                int(start),
                                int(length),
                                " ".join(t.lower() for t in span),
                                " ".join(span),
                            )
                        )
                yield pd.DataFrame(
                    rows,
                    columns=["tweet_id", "sent_id", "start", "length", "key", "surface"],
                )

        return tweets_df.mapInPandas(run, schema=MENTIONS_SCHEMA)
