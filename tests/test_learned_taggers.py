"""Tests for the learned Local EMD systems (TwitterNLP, Aguilar,
BERTweet) and their shared deep machinery."""
import numpy as np
import pytest

from repro.eval.metrics import score_mentions
from repro.local_emd.deep import gazetteer_features, train_bio_tagger
from repro.nn.mlp import MLP


class TestGazetteerFeatures:
    def test_unigram_hit(self):
        f = gazetteer_features(["Coronavirus", "x"], {"coronavirus"}, {"coronavirus"})
        assert f[0].tolist() == [1.0, 1.0]
        assert f[1].tolist() == [0.0, 0.0]

    def test_multigram_token_hit(self):
        f = gazetteer_features(["Andy"], set(), {"andy", "beshear"})
        assert f[0].tolist() == [0.0, 1.0]

    def test_case_insensitive(self):
        f = gazetteer_features(["UK"], {"uk"}, {"uk"})
        assert f[0, 0] == 1.0


class TestTrainBioTagger:
    def test_learns_trivially_separable_tags(self):
        rng = np.random.default_rng(0)
        X = rng.normal(size=(600, 4)).astype(np.float32)
        Y = np.zeros((600, 3), dtype=np.float32)
        # class = sign pattern of first feature
        b_mask = X[:, 0] > 0.5
        i_mask = (X[:, 0] <= 0.5) & (X[:, 0] > 0)
        Y[b_mask, 1] = 1
        Y[i_mask, 2] = 1
        Y[~(b_mask | i_mask), 0] = 1
        m = MLP.build([4, 16, 3], ["relu", "sigmoid"], seed=1)
        # small toy set -> few minibatches per epoch; compensate with a
        # higher lr and more epochs than the corpus-scale defaults
        hist = train_bio_tagger(m, X, Y, lr=1e-2, epochs=300, patience=40, seed=1)
        acc = (np.argmax(m.forward(X), axis=1) == np.argmax(Y, axis=1)).mean()
        assert acc > 0.93
        assert hist["best_val_loss"] < 0.4


class TestFittedSystems:
    def test_twitter_nlp_requires_fit(self, vocab):
        from repro.local_emd.twitter_nlp import TwitterNLP

        with pytest.raises(RuntimeError):
            TwitterNLP(vocab.gazetteer()).tag_sentence(["a"], 0, 0)

    def test_deep_requires_fit(self, vocab):
        from repro.local_emd.aguilar import make_aguilar

        s = make_aguilar(vocab.entity_token_familiarity(), vocab.gazetteer())
        with pytest.raises(RuntimeError):
            s.tag_sentence(["a"], 0, 0)

    def test_twitter_nlp_freq_buckets(self, twitter_nlp):
        assert twitter_nlp._freq_bucket("zzzunseenzzz") == 0
        # the most common training token must land in the top bucket
        top = max(twitter_nlp.freq, key=twitter_nlp.freq.get)
        assert twitter_nlp._freq_bucket(top) == 3

    @pytest.mark.parametrize("fixture", ["twitter_nlp", "aguilar", "bertweet"])
    def test_f1_in_paper_band(self, request, fixture, d1_small):
        """Local EMD effectiveness must land in the paper's observed
        band (Table III local F1 ranges 0.37-0.70 across systems and
        datasets) — neither degenerate nor oracle-perfect."""
        system = request.getfixturevalue(fixture)
        pred = system.tag_pandas(d1_small.tweets)
        prf = score_mentions(pred, d1_small.gold)
        assert 0.30 <= prf.f1 <= 0.80, (fixture, prf)

    @pytest.mark.parametrize("fixture", ["aguilar", "bertweet"])
    def test_inconsistent_detection_across_stream(self, request, fixture, d1_small):
        """The paper's core observation: the same entity is detected in
        some tweets and missed in others."""
        system = request.getfixturevalue(fixture)
        pred = system.tag_pandas(d1_small.tweets)
        found_keys = set(pred["key"]) & set(d1_small.gold["key"])
        gold_counts = d1_small.gold[d1_small.gold["key"].isin(found_keys)].groupby("key").size()
        span_cols = ["tweet_id", "sent_id", "start", "length"]
        gold_spans = set(map(tuple, d1_small.gold[span_cols].itertuples(index=False)))
        pred_spans = set(map(tuple, pred[span_cols].itertuples(index=False)))
        hit = d1_small.gold[
            [tuple(r) in pred_spans for r in d1_small.gold[span_cols].itertuples(index=False)]
        ]
        hit_counts = hit.groupby("key").size()
        partial = [
            k for k in gold_counts.index
            if 0 < hit_counts.get(k, 0) < gold_counts[k]
        ]
        assert len(partial) > 10, "expected many entities with partially-missed mentions"

    def test_aguilar_embedding_dim(self, aguilar):
        emb = aguilar.entity_aware_embeddings(["Italy", "is", "rising"], 0, 0)
        assert emb.shape == (3, 100)

    def test_bertweet_embedding_dim(self, bertweet):
        emb = bertweet.entity_aware_embeddings(["Italy"], 0, 0)
        assert emb.shape == (1, 768)

    def test_entity_aware_deterministic(self, aguilar):
        a = aguilar.entity_aware_embeddings(["Italy", "rising"], 5, 0)
        b = aguilar.entity_aware_embeddings(["Italy", "rising"], 5, 0)
        assert np.array_equal(a, b)

    def test_entity_aware_context_sensitive(self, aguilar):
        a = aguilar.entity_aware_embeddings(["Italy"], 5, 0)
        b = aguilar.entity_aware_embeddings(["Italy"], 6, 0)
        assert not np.array_equal(a, b)

    def test_tag_sentence_empty(self, aguilar):
        assert aguilar.tag_sentence([], 0, 0) == []

    def test_pickle_roundtrip_tags_identically(self, aguilar, d1_small):
        import pickle

        clone = pickle.loads(pickle.dumps(aguilar))
        sub = d1_small.tweets.head(30)
        a = aguilar.tag_pandas(sub)
        b = clone.tag_pandas(sub)
        assert a.equals(b)
