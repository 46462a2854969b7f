"""Smoke tests for the table-level experiment runners and the variant
factory — small scales, asserting structure and the headline shapes."""
import numpy as np
import pytest

from repro.eval import paper_numbers as paper
from repro.eval.experiments import (
    make_system,
    run_ablation,
    run_error_analysis,
    run_table1,
    run_table2,
    run_table3,
    run_table4,
)


class TestPaperNumbers:
    def test_table3_complete_grid(self):
        assert set(paper.TABLE3) == {
            (d, s) for d in paper.DATASETS for s in paper.SYSTEMS
        }

    def test_table4_complete_grid(self):
        assert set(paper.TABLE4) == {
            (d, s) for d in paper.DATASETS for s in ["EMD Globalizer", "HIRE-NER"]
        }

    def test_paper_claims_internally_consistent(self):
        # global F1 beats local F1 in every published cell
        for cell in paper.TABLE3.values():
            assert cell["gF1"] > cell["lF1"]
        # Globalizer beats HIRE-NER on every dataset
        for d in paper.DATASETS:
            assert (
                paper.TABLE4[(d, "EMD Globalizer")]["F1"]
                > paper.TABLE4[(d, "HIRE-NER")]["F1"]
            )

    def test_overall_average_gain_matches_text(self):
        gains = [c["gain"] for c in paper.TABLE3.values()]
        assert np.mean(gains) == pytest.approx(25.61, abs=0.2)


class TestMakeSystem:
    @pytest.mark.parametrize("name", paper.SYSTEMS)
    def test_all_systems_constructible(self, name):
        s = make_system(name)
        assert s.name == name

    def test_unknown_raises(self):
        with pytest.raises(ValueError):
            make_system("SpaCy")

    def test_deep_flags(self):
        assert not make_system("NP Chunker").is_deep
        assert not make_system("TwitterNLP").is_deep
        assert make_system("Aguilar et al.").is_deep
        assert make_system("BERTweet").is_deep


class TestTable1:
    def test_rows_and_columns(self):
        t = run_table1(scale=0.02)
        assert set(t["dataset"]) == {*paper.DATASETS, "d5"}
        assert {"size", "n_topics", "n_hashtags", "n_entities", "n_mentions"} <= set(
            t.columns
        )

    def test_paper_sizes_attached(self):
        t = run_table1(scale=0.02).set_index("dataset")
        assert t.loc["d2", "paper_size"] == 2000


class TestTable2:
    def test_structure_and_band(self, aguilar_variant, chunker_variant):
        t = run_table2(
            {"Aguilar et al.": aguilar_variant, "NP Chunker": chunker_variant}
        )
        assert list(t["system"]) == ["Aguilar et al.", "NP Chunker"]
        assert t.set_index("system").loc["NP Chunker", "emb_size"] == "6+1"
        assert t.set_index("system").loc["Aguilar et al.", "emb_size"] == "100+1"
        # classifier must be useful. Paper reports ~0.9+; at this test's
        # tiny D5 scale the syntactic (6-d) variant sits lower because
        # singleton candidates dominate (see EXPERIMENTS.md).
        assert (t["val_f1"] > 0.6).all()


class TestTable3:
    def test_one_cell_shape(self, spark, aguilar_variant):
        t = run_table3(
            spark, {"Aguilar et al.": aguilar_variant}, datasets=["d1"], scale=0.3
        )
        assert len(t) == 1
        row = t.iloc[0]
        assert row["global_F1"] > row["local_F1"]
        assert row["paper_local_F1"] == 0.64
        assert row["time_overhead_s"] > 0


class TestTable4:
    def test_globalizer_beats_hire(self, spark, aguilar_variant):
        t = run_table4(spark, aguilar_variant, datasets=["d1"], scale=0.3, hire_epochs=6)
        t = t.set_index("system")
        assert t.loc["EMD Globalizer", "F1"] > t.loc["HIRE-NER", "F1"]


class TestAblationAndErrors:
    def test_ablation_columns(self, spark, aguilar_variant):
        t = run_ablation(spark, aguilar_variant, datasets=("d1",), scale=0.25)
        assert {"F1_local", "F1_mining", "F1_full"} <= set(t.columns)
        assert (t["F1_full"] >= t["F1_local"]).all()

    def test_error_analysis_keys_and_consistency(self, spark, aguilar_variant):
        stats = run_error_analysis(
            spark, aguilar_variant, datasets=("d1",), scale=0.25
        )
        assert stats["total_mentions"] > 0
        assert (
            stats["lost_never_candidate_mentions"]
            + stats["lost_classifier_fn_mentions"]
            <= stats["total_mentions"]
        )
        assert stats["classifier_recall_by_freq_bin"]
        # structural consistency of the Fig. 7 bins; the rising-recall
        # *shape* is only stable at full scale (verified by the captured
        # run in EXPERIMENTS.md — 0.61 at <=5 mentions rising to ~1.0)
        recalls = list(stats["classifier_recall_by_freq_bin"].values())
        counts = list(stats["classifier_recall_by_freq_bin_counts"].values())
        assert len(recalls) == len(counts)
        assert all(0.0 <= r <= 1.0 for r in recalls)
        assert all(c >= 1 for c in counts)
