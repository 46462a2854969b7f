"""Tests for the synthetic STS-benchmark generator."""
import numpy as np
import pytest

from repro.streams.sts import STS_TRAIN_PAIRS, STS_VAL_PAIRS, generate_sts


@pytest.fixture(scope="module")
def pairs():
    return generate_sts(400, 100, seed=21)


class TestGenerateSts:
    def test_counts(self, pairs):
        train, val = pairs
        assert len(train) == 400 and len(val) == 100

    def test_default_sizes_match_stsb(self):
        assert STS_TRAIN_PAIRS == 5749 and STS_VAL_PAIRS == 1500

    def test_scores_normalized(self, pairs):
        train, val = pairs
        for p in train + val:
            assert 0.0 <= p.score <= 1.0

    def test_sentences_nonempty_token_tuples(self, pairs):
        train, _ = pairs
        for p in train[:50]:
            assert len(p.tokens_a) >= 5 and len(p.tokens_b) >= 5
            assert isinstance(p.tokens_a, tuple)

    def test_score_bands_present(self, pairs):
        train, _ = pairs
        scores = np.array([p.score for p in train])
        assert (scores > 0.8).mean() > 0.15
        assert (scores < 0.3).mean() > 0.15
        assert ((scores > 0.4) & (scores < 0.7)).mean() > 0.15

    def test_high_score_pairs_share_tokens(self, pairs):
        train, _ = pairs
        high = [p for p in train if p.score > 0.8][:30]
        low = [p for p in train if p.score < 0.2][:30]
        high_overlap = np.mean(
            [len(set(p.tokens_a) & set(p.tokens_b)) for p in high]
        )
        low_overlap = np.mean(
            [len(set(p.tokens_a) & set(p.tokens_b)) for p in low]
        )
        assert high_overlap > low_overlap + 1.0

    def test_deterministic(self):
        a_train, _ = generate_sts(50, 10, seed=3)
        b_train, _ = generate_sts(50, 10, seed=3)
        assert [p.tokens_a for p in a_train] == [p.tokens_a for p in b_train]
        assert [p.score for p in a_train] == [p.score for p in b_train]
