"""Synthetic STS-benchmark stand-in for training the Entity Phrase Embedder.

The paper trains its SBERT-style siamese head on STS-b (5749 train /
1500 validation sentence pairs, scored 0–5, normalized to [0, 1]).
STS-b is not available offline, so we generate scored pairs over the
same synthetic vocabulary the tweet corpora use: two token sequences
share entities and/or topic vocabulary in proportion to their score.
This trains the identical objective — cosine similarity of pooled
embeddings regressed onto a normalized similarity score with MSE loss.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.streams import vocab as V
from repro.streams.generator import default_vocabulary

__all__ = ["StsPair", "generate_sts", "STS_TRAIN_PAIRS", "STS_VAL_PAIRS"]

STS_TRAIN_PAIRS = 5749
STS_VAL_PAIRS = 1500


@dataclass(frozen=True)
class StsPair:
    """One scored sentence pair; ``score`` already normalized to [0,1]."""

    tokens_a: tuple
    tokens_b: tuple
    score: float


def _sentence(
    rng: np.random.Generator,
    words: list,
    entities: list,
    n_shared_words: int,
    shared_entity: V.Entity | None,
) -> tuple:
    toks = list(rng.choice(words, size=int(rng.integers(5, 11))))
    for i, t in enumerate(toks):
        if rng.random() < 0.1:
            toks[i] = t.capitalize()
    if n_shared_words:
        toks[: n_shared_words] = words[:n_shared_words]
    if shared_entity is not None:
        pos = int(rng.integers(0, len(toks)))
        toks[pos:pos] = [t.capitalize() for t in shared_entity.tokens]
    elif rng.random() < 0.5 and entities:
        e = entities[int(rng.integers(len(entities)))]
        pos = int(rng.integers(0, len(toks)))
        toks[pos:pos] = [t.capitalize() for t in e.tokens]
    return tuple(toks)


def generate_sts(
    n_train: int = STS_TRAIN_PAIRS, n_val: int = STS_VAL_PAIRS, seed: int = 21
) -> tuple:
    """Return (train_pairs, val_pairs) lists of :class:`StsPair`.

    Score bands: ~[0.8,1.0] share an entity and topical words, ~[0.4,0.7]
    share topical words only, ~[0.0,0.3] are unrelated draws — the same
    graded-similarity structure STS-b provides.
    """
    voc = default_vocabulary()
    rng = np.random.default_rng(seed)
    # carve a dedicated region of the vocabulary for STS so phrase-
    # embedder training does not memorize test-stream entities
    words = voc.common_words[:2500]
    entities = voc.entities[-800:]

    def make(n: int, rng: np.random.Generator) -> list:
        pairs = []
        for _ in range(n):
            band = rng.random()
            # word pools for two (possibly different) pseudo-topics
            w_a = list(rng.choice(words, size=40, replace=False))
            if band < 0.35:  # high similarity: shared entity + topic words
                shared = int(rng.integers(3, 6))
                e = entities[int(rng.integers(len(entities)))]
                a = _sentence(rng, w_a, [], shared, e)
                b = _sentence(rng, w_a, [], shared, e)
                score = float(np.clip(rng.normal(0.9, 0.06), 0, 1))
            elif band < 0.70:  # medium: same topic words, no shared entity
                shared = int(rng.integers(2, 4))
                a = _sentence(rng, w_a, entities, shared, None)
                b = _sentence(rng, w_a, entities, shared, None)
                score = float(np.clip(rng.normal(0.55, 0.08), 0, 1))
            else:  # low: disjoint topics
                w_b = list(rng.choice(words, size=40, replace=False))
                a = _sentence(rng, w_a, entities, 0, None)
                b = _sentence(rng, w_b, entities, 0, None)
                score = float(np.clip(rng.normal(0.12, 0.07), 0, 1))
            pairs.append(StsPair(a, b, score))
        return pairs

    return make(n_train, rng), make(n_val, rng)
