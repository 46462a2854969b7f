"""Unit tests for the synthetic vocabulary (repro.streams.vocab)."""
import numpy as np
import pytest

from repro.streams import vocab as V


@pytest.fixture(scope="module")
def voc():
    return V.build_vocabulary(n_common=500, n_entities=300, seed=7)


class TestBuildVocabulary:
    def test_counts(self, voc):
        assert len(voc.common_words) == 500
        assert len(voc.entities) == 300

    def test_common_words_lowercase_unique(self, voc):
        assert all(w == w.lower() for w in voc.common_words)
        assert len(set(voc.common_words)) == 500

    def test_weights_are_zipf_normalized(self, voc):
        assert voc.common_weights.sum() == pytest.approx(1.0)
        assert voc.common_weights[0] > voc.common_weights[-1]

    def test_deterministic_in_seed(self):
        a = V.build_vocabulary(n_common=100, n_entities=50, seed=9)
        b = V.build_vocabulary(n_common=100, n_entities=50, seed=9)
        assert a.common_words == b.common_words
        assert [e.key for e in a.entities] == [e.key for e in b.entities]

    def test_different_seed_differs(self):
        a = V.build_vocabulary(n_common=100, n_entities=50, seed=9)
        b = V.build_vocabulary(n_common=100, n_entities=50, seed=10)
        assert a.common_words != b.common_words

    def test_entity_keys_unique(self, voc):
        keys = [e.key for e in voc.entities]
        assert len(set(keys)) == len(keys)

    def test_entity_tokens_disjoint_from_common_words(self, voc):
        common = set(voc.common_words)
        for e in voc.entities:
            assert not any(t in common for t in e.tokens)

    def test_entity_token_counts_in_range(self, voc):
        assert all(1 <= len(e.tokens) <= 3 for e in voc.entities)

    def test_familiarity_in_unit_interval(self, voc):
        assert all(0.0 <= e.familiarity <= 1.0 for e in voc.entities)

    def test_eids_are_positions(self, voc):
        assert [e.eid for e in voc.entities] == list(range(300))

    def test_hashtags_and_handles_prefixed(self, voc):
        assert all(h.startswith("#") for h in voc.hashtag_words)
        assert all(u.startswith("@") for u in voc.user_handles)


class TestEntity:
    def test_surface_proper_cased(self):
        e = V.Entity(0, ("andy", "beshear"), 0, 0.5, True)
        assert e.surface == "Andy Beshear"

    def test_key_lowercase(self):
        e = V.Entity(0, ("andy", "beshear"), 0, 0.5, True)
        assert e.key == "andy beshear"


class TestDerivedLookups:
    def test_token_familiarity_takes_max(self, voc):
        fam = voc.entity_token_familiarity()
        for e in voc.entities:
            for t in e.tokens:
                assert fam[t] >= e.familiarity

    def test_gazetteer_subset_of_keys(self, voc):
        gaz = voc.gazetteer()
        keys = {e.key for e in voc.entities}
        assert gaz <= keys
        assert 0 < len(gaz) < len(keys)

    def test_gazetteer_skews_familiar(self, voc):
        in_g = [e.familiarity for e in voc.entities if e.in_gazetteer]
        out_g = [e.familiarity for e in voc.entities if not e.in_gazetteer]
        assert np.mean(in_g) > np.mean(out_g)


class TestVariants:
    def test_sample_variant_valid(self):
        rng = np.random.default_rng(0)
        seen = {V.sample_variant(rng, 2) for _ in range(200)}
        assert seen <= {"proper", "lower", "allcaps", "substring"}
        assert "proper" in seen and "lower" in seen

    def test_unigram_never_substring(self):
        rng = np.random.default_rng(0)
        assert all(V.sample_variant(rng, 1) != "substring" for _ in range(300))

    def test_render_proper(self):
        rng = np.random.default_rng(0)
        assert V.render_mention(("andy", "beshear"), "proper", rng) == ["Andy", "Beshear"]

    def test_render_lower(self):
        rng = np.random.default_rng(0)
        assert V.render_mention(("andy", "beshear"), "lower", rng) == ["andy", "beshear"]

    def test_render_allcaps(self):
        rng = np.random.default_rng(0)
        assert V.render_mention(("un",), "allcaps", rng) == ["UN"]

    def test_render_substring_capitalizes_proper_prefix(self):
        rng = np.random.default_rng(0)
        out = V.render_mention(("andy", "beshear", "jr"), "substring", rng)
        caps = [t[0].isupper() for t in out]
        assert any(caps) and not all(caps)
        # prefix property: no lowercase token before a capitalized one
        assert caps == sorted(caps, reverse=True)
