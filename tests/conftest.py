"""Shared expensive fixtures for the test suite.

Fitted Local EMD systems and framework variants are session-scoped:
training even the small-scale variants costs seconds, and dozens of
tests consume them read-only.
"""
from __future__ import annotations

import pytest

from repro.eval.experiments import make_system
from repro.streams import generator as gen

# scales used by the shared fixtures: small enough for fast tests, large
# enough that taggers/classifiers train to sensible operating points
# (the Entity Classifier needs a few thousand D5 tweets before its
# false-negative rate stops eating the mining recall gain)
TRAIN_SCALE = 0.3
D5_SCALE = 0.1


@pytest.fixture(scope="session")
def vocab():
    return gen.default_vocabulary()


@pytest.fixture(scope="session")
def train_small():
    return gen.generate("wnut17_train", scale=TRAIN_SCALE)


@pytest.fixture(scope="session")
def d1_small():
    return gen.generate("d1", scale=0.5)


@pytest.fixture(scope="session")
def np_chunker():
    return make_system("NP Chunker")


@pytest.fixture(scope="session")
def twitter_nlp(train_small):
    s = make_system("TwitterNLP")
    s.fit(train_small.tweets, train_small.gold)
    return s


@pytest.fixture(scope="session")
def aguilar(train_small):
    s = make_system("Aguilar et al.")
    s.fit(train_small.tweets, train_small.gold)
    return s


@pytest.fixture(scope="session")
def bertweet(train_small):
    s = make_system("BERTweet")
    s.fit(train_small.tweets, train_small.gold)
    return s


@pytest.fixture(scope="session")
def aguilar_variant(spark):
    """Fully fitted Aguilar-instantiated framework at test scale."""
    from repro.core.pipeline import build_variant

    return build_variant(
        spark, make_system("Aguilar et al."), scale=TRAIN_SCALE, d5_scale=D5_SCALE
    )


@pytest.fixture(scope="session")
def chunker_variant(spark):
    """Non-deep (syntactic-embedding path) variant at test scale."""
    from repro.core.pipeline import build_variant

    return build_variant(
        spark, make_system("NP Chunker"), scale=TRAIN_SCALE, d5_scale=D5_SCALE
    )
