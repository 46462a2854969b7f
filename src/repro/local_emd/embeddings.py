"""Synthetic pretrained token embeddings with per-occurrence context noise.

The paper's deep Local EMD systems consume pretrained representations
(Twitter word2vec for Aguilar et al., a BERT encoder for BERTweet) that
cannot be shipped offline. This bank reproduces the two properties of
those representations that the framework's behaviour depends on:

1. **Familiarity structure** — tokens of entities that are well covered
   by pretraining carry a strong component along a common "entityness"
   direction; rare/emergent entity tokens carry a weak one. This is why
   the paper's local systems detect famous entities reliably and novel
   ones inconsistently.
2. **Contextual variation** — each *occurrence* of a token gets a
   deterministic pseudo-random perturbation, so the same surface string
   yields different contextual embeddings in different tweets. This is
   the source of the paper's observation that local EMD detects a
   mention in one tweet and misses the identical string in another.

Determinism: base vectors are seeded by a stable hash of the token;
occurrence noise indexes a fixed pool by a stable hash of
``(tweet_id, sent_id, position)``. Re-computing an embedding anywhere in
the pipeline (local tagging, global mining) therefore yields bit-equal
values — verified by tests — which lets the Spark dataflow recompute
instead of materializing 768-d vectors for every token of a corpus.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass, field

import numpy as np

__all__ = ["EmbeddingBank"]

_NOISE_POOL = 8192


def _stable_hash(s: str) -> int:
    return zlib.crc32(s.encode("utf-8"))


@dataclass
class EmbeddingBank:
    """Deterministic hashed-Gaussian embeddings with an entityness axis."""

    dim: int
    token_familiarity: dict  # lowercase token -> max familiarity over entities
    entity_strength: float = 1.2
    noise_sigma: float = 0.6
    # per-occurrence noise *along the entityness axis*. Isotropic noise
    # alone is nearly orthogonal to any fixed direction at high dim
    # (projection std ~ sigma/sqrt(dim)), which would make entityness a
    # noiseless feature and detection perfectly consistent; this scalar
    # restores the occurrence-level ambiguity the paper observes (the
    # same string detected in one tweet, missed in another).
    direction_sigma: float = 0.4
    seed: int = 101
    _cache: dict = field(default_factory=dict, repr=False, compare=False)
    _direction: np.ndarray | None = field(default=None, repr=False, compare=False)
    _noise: np.ndarray | None = field(default=None, repr=False, compare=False)
    _scalars: np.ndarray | None = field(default=None, repr=False, compare=False)

    def __getstate__(self):  # drop caches when broadcast to executors
        d = self.__dict__.copy()
        d["_cache"] = {}
        d["_direction"] = None
        d["_noise"] = None
        d["_scalars"] = None
        return d

    @property
    def direction(self) -> np.ndarray:
        """The unit 'entityness' direction shared by all entity tokens."""
        if self._direction is None:
            g = np.random.default_rng(self.seed)
            v = g.normal(size=self.dim)
            self._direction = (v / np.linalg.norm(v)).astype(np.float32)
        return self._direction

    @property
    def noise_pool(self) -> np.ndarray:
        if self._noise is None:
            g = np.random.default_rng(self.seed + 1)
            self._noise = g.normal(
                0.0, 1.0 / np.sqrt(self.dim), (_NOISE_POOL, self.dim)
            ).astype(np.float32)
        return self._noise

    @property
    def scalar_pool(self) -> np.ndarray:
        if self._scalars is None:
            g = np.random.default_rng(self.seed + 2)
            self._scalars = g.normal(0.0, 1.0, _NOISE_POOL).astype(np.float32)
        return self._scalars

    def base_vector(self, token: str) -> np.ndarray:
        """Type-level embedding of the lowercased token."""
        t = token.lower()
        vec = self._cache.get(t)
        if vec is None:
            g = np.random.default_rng((_stable_hash(t) * 2654435761 + self.seed) % 2**63)
            vec = g.normal(0.0, 1.0 / np.sqrt(self.dim), self.dim).astype(np.float32)
            fam = self.token_familiarity.get(t)
            if fam is not None:
                vec = vec + np.float32(fam * self.entity_strength) * self.direction
            self._cache[t] = vec
        return vec

    def contextual(
        self, tokens: list, tweet_id: int, sent_id: int, start: int = 0
    ) -> np.ndarray:
        """Occurrence-level embeddings for ``tokens`` at positions
        ``start..start+n`` of sentence ``(tweet_id, sent_id)``.

        Returns an ``(n, dim)`` float32 matrix: base vector + sigma-scaled
        pool noise keyed by the absolute occurrence coordinates.
        """
        n = len(tokens)
        out = np.empty((n, self.dim), dtype=np.float32)
        pool = self.noise_pool
        scalars = self.scalar_pool
        direction = self.direction
        for i, tok in enumerate(tokens):
            h = _stable_hash(f"{tweet_id}|{sent_id}|{start + i}") % _NOISE_POOL
            out[i] = (
                self.base_vector(tok)
                + np.float32(self.noise_sigma) * pool[h]
                + np.float32(self.direction_sigma * scalars[h]) * direction
            )
        return out

    def entityness(self, token: str) -> float:
        """Projection of the token's base vector on the entityness axis —
        a diagnostic used by calibration tests."""
        return float(self.base_vector(token) @ self.direction)
