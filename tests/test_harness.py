"""Tests for the Table III row harness arithmetic."""
import pytest

from repro.eval.harness import TableIIIRow
from repro.eval.metrics import PRF


def prf(p, r):
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return PRF(p, r, f1, 100, 100, int(100 * r))


class TestTableIIIRow:
    def test_gain_pct(self):
        row = TableIIIRow("d1", "X", prf(0.5, 0.5), prf(0.75, 0.75), 1.0, 0.2)
        assert row.f1_gain_pct == pytest.approx(50.0)

    def test_zero_local_f1_infinite_gain(self):
        row = TableIIIRow("d1", "X", prf(0.0, 0.0), prf(0.5, 0.5), 1.0, 0.2)
        assert row.f1_gain_pct == float("inf")

    def test_total_seconds(self):
        row = TableIIIRow("d1", "X", prf(0.5, 0.5), prf(0.6, 0.6), 1.5, 0.25)
        assert row.total_seconds == pytest.approx(1.75)

    def test_row_dict_keys(self):
        row = TableIIIRow("d1", "X", prf(0.5, 0.5), prf(0.6, 0.6), 1.5, 0.25)
        d = row.row()
        assert d["dataset"] == "d1" and d["system"] == "X"
        assert d["time_overhead_s"] == 0.25
        assert d["local_F1"] == 0.5 and d["global_F1"] == 0.6

    def test_negative_gain_possible(self):
        # the harness must faithfully report regressions too
        row = TableIIIRow("d1", "X", prf(0.8, 0.8), prf(0.4, 0.4), 1.0, 0.1)
        assert row.f1_gain_pct == pytest.approx(-50.0)
