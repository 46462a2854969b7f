"""Shared machinery for learned BIO taggers (deep and linear).

Implements the supervised sequence-labeling core the paper's Local EMD
systems share: per-token feature construction, three-way (O/B/I)
sigmoid-head training with Adam on the WNUT17-train stand-in corpus, and
BIO decoding. Deep systems add a contextual-embedding input and expose
their penultimate layer as the 'entity-aware' token embedding consumed
by Global EMD (Section IV: "the output of the neural network's final
layer before token-level classification").
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.local_emd.base import (
    LocalEMDSystem,
    bio_to_spans,
    spans_to_bio,
    surface_features,
)
from repro.local_emd.embeddings import EmbeddingBank
from repro.nn.mlp import MLP, AdamState

__all__ = ["train_bio_tagger", "gazetteer_features", "DeepEMDSystem"]


def train_bio_tagger(
    model: MLP,
    X: np.ndarray,
    Y: np.ndarray,
    *,
    lr: float = 1e-3,
    batch_size: int = 256,
    epochs: int = 12,
    patience: int = 3,
    val_frac: float = 0.1,
    seed: int = 0,
) -> dict:
    """Train a (n,3)-sigmoid tagger with per-class BCE + Adam.

    The gradient of BCE w.r.t. the sigmoid input is ``p - y``; we feed
    ``(p - y) / (p (1-p))`` through the sigmoid layer's backward pass,
    which reduces to the same thing while keeping the layer abstraction.
    """
    rng = np.random.default_rng(seed)
    n = X.shape[0]
    order = rng.permutation(n)
    n_val = max(1, int(n * val_frac))
    val_idx, tr_idx = order[:n_val], order[n_val:]
    Xtr, Ytr, Xval, Yval = X[tr_idx], Y[tr_idx], X[val_idx], Y[val_idx]
    state = AdamState.for_layers(model.layers)
    best_val = np.inf
    best = model.to_arrays()
    stale = 0
    for _epoch in range(epochs):
        perm = rng.permutation(len(Xtr))
        for s in range(0, len(Xtr), batch_size):
            idx = perm[s : s + batch_size]
            p = model.forward(Xtr[idx])
            p_c = np.clip(p, 1e-7, 1 - 1e-7)
            grad = (p_c - Ytr[idx]) / (p_c * (1 - p_c)) / len(idx)
            model.adam_step(model.backward(grad), state, lr)
        pv = np.clip(model.forward(Xval), 1e-7, 1 - 1e-7)
        val = float(-(Yval * np.log(pv) + (1 - Yval) * np.log(1 - pv)).mean())
        if val < best_val - 1e-6:
            best_val, stale = val, 0
            best = model.to_arrays()
        else:
            stale += 1
            if stale >= patience:
                break
    model.layers = MLP.from_arrays(best).layers
    return {"best_val_loss": best_val}


def gazetteer_features(tokens: list, unigram_keys: set, all_tokens: set) -> np.ndarray:
    """Two lexical features per token: exact unigram-gazetteer hit, and
    membership in any gazetteer entry's token set (the paper's Aguilar
    instantiation encodes gazetteer hits as a small lexical vector)."""
    f = np.zeros((len(tokens), 2), dtype=np.float32)
    for i, t in enumerate(tokens):
        low = t.lower()
        f[i, 0] = low in unigram_keys
        f[i, 1] = low in all_tokens
    return f


def _one_hot_bio(tags: np.ndarray) -> np.ndarray:
    Y = np.zeros((len(tags), 3), dtype=np.float32)
    Y[np.arange(len(tags)), tags] = 1.0
    return Y


class DeepEMDSystem(LocalEMDSystem):
    """A deep Local EMD tagger over synthetic contextual embeddings.

    ``hidden`` fixes the architecture; the last hidden width is the
    penultimate layer = the entity-aware embedding dimension the paper
    taps (100 for Aguilar et al., 768 for BERTweet).
    """

    is_deep = True

    def __init__(
        self,
        name: str,
        bank: EmbeddingBank,
        hidden: list,
        *,
        gazetteer_keys: set | None = None,
        seed: int = 0,
        epochs: int = 12,
        lr: float = 1e-3,
    ):
        self.name = name
        self.bank = bank
        self.hidden = list(hidden)
        self.embedding_dim = self.hidden[-1]
        self.gaz_uni = None
        self.gaz_tokens = None
        if gazetteer_keys is not None:
            self.gaz_uni = {k for k in gazetteer_keys if " " not in k}
            self.gaz_tokens = {t for k in gazetteer_keys for t in k.split(" ")}
        self.seed = seed
        self.epochs = epochs
        self.lr = lr
        self.model: MLP | None = None
        self.train_info: dict = {}

    @property
    def n_features(self) -> int:
        return self.bank.dim + 9 + (2 if self.gaz_uni is not None else 0)

    def _features(self, tokens: list, tweet_id: int, sent_id: int) -> np.ndarray:
        emb = self.bank.contextual([t.lower() for t in tokens], tweet_id, sent_id)
        parts = [emb, surface_features(tokens)]
        if self.gaz_uni is not None:
            parts.append(gazetteer_features(tokens, self.gaz_uni, self.gaz_tokens))
        return np.concatenate(parts, axis=1)

    def fit(self, train_tweets: pd.DataFrame, train_gold: pd.DataFrame) -> None:
        gold_by_sent: dict = {}
        for r in train_gold.itertuples():
            gold_by_sent.setdefault((r.tweet_id, r.sent_id), []).append(
                (r.start, r.length)
            )
        Xs, Ys = [], []
        for r in train_tweets.itertuples():
            toks = list(r.tokens)
            Xs.append(self._features(toks, int(r.tweet_id), int(r.sent_id)))
            tags = spans_to_bio(len(toks), gold_by_sent.get((r.tweet_id, r.sent_id), []))
            Ys.append(_one_hot_bio(tags))
        X = np.concatenate(Xs).astype(np.float32)
        Y = np.concatenate(Ys).astype(np.float32)
        sizes = [self.n_features, *self.hidden, 3]
        acts = ["relu"] * len(self.hidden) + ["sigmoid"]
        self.model = MLP.build(sizes, acts, seed=self.seed)
        self.train_info = train_bio_tagger(
            self.model, X, Y, lr=self.lr, epochs=self.epochs, seed=self.seed
        )

    def _check_fitted(self) -> None:
        if self.model is None:
            raise RuntimeError(f"{self.name}: call fit() before tagging")

    def tag_sentence(self, tokens: list, tweet_id: int, sent_id: int) -> list:
        self._check_fitted()
        if not tokens:
            return []
        p = self.model.forward(self._features(tokens, tweet_id, sent_id))
        return bio_to_spans(np.argmax(p, axis=1))

    def entity_aware_embeddings(
        self, tokens: list, tweet_id: int, sent_id: int
    ) -> np.ndarray:
        """Penultimate-layer activations for every token (float32)."""
        self._check_fitted()
        return self.model.penultimate(
            self._features(tokens, tweet_id, sent_id)
        ).astype(np.float32)
