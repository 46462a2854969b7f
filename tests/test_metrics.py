"""Tests for the surface-form EMD metric."""
import pandas as pd
import pytest

from repro.eval.metrics import score_mentions


def frame(spans):
    return pd.DataFrame(spans, columns=["tweet_id", "sent_id", "start", "length"])


class TestScoreMentions:
    def test_perfect(self):
        g = frame([(1, 0, 0, 1), (2, 0, 3, 2)])
        prf = score_mentions(g.copy(), g)
        assert prf.precision == prf.recall == prf.f1 == 1.0

    def test_empty_predictions(self):
        prf = score_mentions(frame([]), frame([(1, 0, 0, 1)]))
        assert prf.precision == 0.0 and prf.recall == 0.0 and prf.f1 == 0.0

    def test_empty_gold(self):
        prf = score_mentions(frame([(1, 0, 0, 1)]), frame([]))
        assert prf.recall == 0.0

    def test_half_precision(self):
        pred = frame([(1, 0, 0, 1), (1, 0, 5, 1)])
        gold = frame([(1, 0, 0, 1)])
        prf = score_mentions(pred, gold)
        assert prf.precision == 0.5 and prf.recall == 1.0
        assert prf.f1 == pytest.approx(2 / 3)

    def test_partial_extraction_counts_wrong(self):
        """A partial span ('Andy' of 'Andy Beshear') is both an FP and an
        FN — the paper's motivation for partial-extraction correction."""
        pred = frame([(1, 0, 0, 1)])
        gold = frame([(1, 0, 0, 2)])
        prf = score_mentions(pred, gold)
        assert prf.precision == 0.0 and prf.recall == 0.0

    def test_duplicate_predictions_collapsed(self):
        pred = frame([(1, 0, 0, 1), (1, 0, 0, 1)])
        gold = frame([(1, 0, 0, 1)])
        prf = score_mentions(pred, gold)
        assert prf.precision == 1.0 and prf.n_pred == 1

    def test_counts_recorded(self):
        pred = frame([(1, 0, 0, 1), (1, 0, 3, 1)])
        gold = frame([(1, 0, 0, 1), (2, 0, 0, 1), (3, 0, 0, 1)])
        prf = score_mentions(pred, gold)
        assert (prf.n_pred, prf.n_gold, prf.n_correct) == (2, 3, 1)

    def test_row_rounding(self):
        pred = frame([(1, 0, 0, 1), (1, 0, 3, 1), (1, 0, 4, 1)])
        gold = frame([(1, 0, 0, 1)])
        row = score_mentions(pred, gold).row()
        assert row["P"] == pytest.approx(0.3333, abs=1e-4)

    def test_extra_columns_ignored(self):
        pred = frame([(1, 0, 0, 1)]).assign(key="x", surface="X")
        gold = frame([(1, 0, 0, 1)]).assign(eid=7)
        assert score_mentions(pred, gold).f1 == 1.0
