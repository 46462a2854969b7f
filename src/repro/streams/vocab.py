"""Deterministic synthetic vocabulary for microblog stream generation.

Real Twitter corpora (D1–D5, WNUT17, BTC) cannot be downloaded in this
container, so the reproduction generates pseudo-English tweet streams.
This module builds the shared lexical inventory:

- a Zipf-weighted **common-word** vocabulary (lowercase noise words),
- an **entity inventory**: 1–3-token proper-cased names with a
  *familiarity* score in [0, 1] that models how well the entity is
  covered by pretrained embeddings / gazetteers (the paper's "rarity of
  many microblog-referenced entities in off-the-shelf lexical
  resources"), and a partial-coverage **gazetteer** drawn from it,
- the six **capitalization variants** of Section V-B-1 used when a
  mention is rendered into a tweet.

Everything is deterministic in ``seed`` so the DuckDB oracle and every
Spark run see identical data.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

__all__ = [
    "Entity",
    "Vocabulary",
    "build_vocabulary",
    "ONSETS",
    "CODAS",
]

# Syllable inventory for pseudo-word construction. Words are built as
# 2-4 onset+coda syllables, giving ~1e5 possible distinct surfaces.
ONSETS = [
    "ba", "ce", "di", "fo", "gu", "ha", "je", "ki", "lo", "mu",
    "na", "pe", "qui", "ro", "su", "ta", "ve", "wi", "yo", "zu",
    "bra", "cle", "dri", "flo", "gra", "ple", "sta", "tre", "vla", "sho",
]
CODAS = ["n", "r", "s", "l", "m", "t", "k", "x", "nd", "st", ""]


def _make_word(rng: np.random.Generator, n_syll: int) -> str:
    parts = []
    for _ in range(n_syll):
        parts.append(ONSETS[rng.integers(len(ONSETS))])
    return "".join(parts) + CODAS[rng.integers(len(CODAS))]


@dataclass(frozen=True)
class Entity:
    """A synthetic entity: canonical proper-cased name tokens plus the
    signals the substrates consume (topic, familiarity, gazetteer flag).
    """

    eid: int
    tokens: tuple
    topic: int
    familiarity: float
    in_gazetteer: bool

    @property
    def surface(self) -> str:
        """Canonical proper-cased surface form."""
        return " ".join(t.capitalize() for t in self.tokens)

    @property
    def key(self) -> str:
        """Case-insensitive candidate key (lowercase, space-joined)."""
        return " ".join(self.tokens)


@dataclass
class Vocabulary:
    """Shared lexical inventory for one generated corpus family."""

    common_words: list
    common_weights: np.ndarray
    entities: list
    hashtag_words: list
    user_handles: list
    # confusable distractors: common (non-entity) words whose pretrained
    # embeddings carry a partial entityness component — e.g. common nouns
    # that often appear in entity-like contexts. Without them, false
    # positive candidates are linearly separable from entities and the
    # Entity Classifier becomes unrealistically perfect.
    pseudo_familiarity: dict = None
    # 'Monday'-type words: common non-entities that are conventionally
    # capitalized wherever they appear. Their mined occurrence
    # distribution looks exactly like an entity's (consistent proper
    # casing), so they are the false positives that survive the Entity
    # Classifier — without them Global precision saturates near 1.0.
    titlecase_words: set = None

    def entity_token_familiarity(self) -> dict:
        """Familiarity per lowercase token as seen by pretrained
        embeddings: entity tokens at their max entity familiarity, plus
        the confusable distractors' partial scores."""
        fam: dict = dict(self.pseudo_familiarity or {})
        for e in self.entities:
            for t in e.tokens:
                fam[t] = max(fam.get(t, 0.0), e.familiarity)
        return fam

    def gazetteer(self) -> set:
        """Set of candidate keys present in the (partial) gazetteer."""
        return {e.key for e in self.entities if e.in_gazetteer}


def build_vocabulary(
    *,
    n_common: int = 4000,
    n_entities: int = 9000,
    n_topics: int = 24,
    seed: int = 7,
    zipf_alpha: float = 1.07,
    gazetteer_coverage: float = 0.5,
) -> Vocabulary:
    """Build the corpus-family vocabulary.

    One vocabulary is shared by all datasets of the reproduction (as the
    English language is shared by the paper's corpora); datasets differ
    in which topics/entities they sample and how often they repeat them.

    ``familiarity`` ~ Beta(2, 2): a mix of well-known and rare entities,
    independent of stream-level popularity — the paper observes that
    even the most frequent stream entities ('Coronavirus') are missed by
    local EMD, so popularity must not imply detectability.
    """
    rng = np.random.default_rng(seed)
    common: list = []
    seen: set = set()
    while len(common) < n_common:
        w = _make_word(rng, int(rng.integers(2, 4)))
        if w not in seen:
            seen.add(w)
            common.append(w)
    ranks = np.arange(1, n_common + 1)
    weights = 1.0 / ranks**zipf_alpha
    weights /= weights.sum()

    entities: list = []
    used_keys: set = set(common)  # keep entity names disjoint from common words
    while len(entities) < n_entities:
        n_tok = int(rng.choice([1, 2, 3], p=[0.55, 0.33, 0.12]))
        toks = []
        for _ in range(n_tok):
            w = _make_word(rng, int(rng.integers(2, 5)))
            toks.append(w)
        key = " ".join(toks)
        if key in used_keys or any(t in seen for t in toks):
            continue
        used_keys.add(key)
        fam = float(rng.beta(2.0, 2.0))
        entities.append(
            Entity(
                eid=len(entities),
                tokens=tuple(toks),
                topic=int(rng.integers(n_topics)),
                familiarity=fam,
                # gazetteers skew toward famous entities
                in_gazetteer=bool(rng.random() < gazetteer_coverage * (0.5 + fam)),
            )
        )
    tag_pool = common[: min(600, len(common))]
    hashtags = [
        f"#{w}"
        for w in rng.choice(tag_pool, size=min(300, len(tag_pool)), replace=False)
    ]
    users = [f"@{_make_word(rng, 3)}{i}" for i in range(200)]
    n_pseudo = max(1, int(0.08 * n_common))
    pseudo = {
        common[int(i)]: float(rng.uniform(0.15, 0.55))
        for i in rng.choice(n_common, size=n_pseudo, replace=False)
    }
    n_title = max(1, int(0.02 * n_common))
    titlecase = {
        common[int(i)] for i in rng.choice(n_common, size=n_title, replace=False)
    }
    # titlecase confusables also read as vaguely entity-like to
    # pretrained embeddings (they inhabit entity-ish contexts)
    for w in titlecase:
        pseudo[w] = max(pseudo.get(w, 0.0), float(rng.uniform(0.3, 0.6)))
    return Vocabulary(common, weights, entities, hashtags, users, pseudo, titlecase)


# ---------------------------------------------------------------------------
# Capitalization variants (Section V-B-1 categories)
# ---------------------------------------------------------------------------

VARIANT_PROPER = "proper"
VARIANT_LOWER = "lower"
VARIANT_ALLCAPS = "allcaps"
VARIANT_SUBSTRING = "substring"

_VARIANTS = [VARIANT_PROPER, VARIANT_LOWER, VARIANT_ALLCAPS, VARIANT_SUBSTRING]
_VARIANT_P = np.array([0.58, 0.22, 0.11, 0.09])


def sample_variant(rng: np.random.Generator, n_tokens: int) -> str:
    """Sample the casing variant for one rendered mention."""
    v = str(rng.choice(_VARIANTS, p=_VARIANT_P))
    if v == VARIANT_SUBSTRING and n_tokens < 2:
        return VARIANT_PROPER
    return v


def render_mention(tokens: tuple, variant: str, rng: np.random.Generator) -> list:
    """Render canonical lowercase ``tokens`` under a casing ``variant``."""
    if variant == VARIANT_PROPER:
        return [t.capitalize() for t in tokens]
    if variant == VARIANT_LOWER:
        return list(tokens)
    if variant == VARIANT_ALLCAPS:
        return [t.upper() for t in tokens]
    # substring: capitalize a proper, non-empty prefix of a multigram
    k = int(rng.integers(1, len(tokens)))
    return [t.capitalize() if i < k else t for i, t in enumerate(tokens)]
