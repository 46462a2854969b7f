"""Table-level experiment runners shared by jobs/ and benchmarks/.

Each ``run_tableN`` reproduces one evaluation table of the paper on the
synthetic corpora and returns a pandas frame with the measured numbers
next to the paper's. ``scale``/``d5_scale`` shrink corpora for tests and
benchmarks; the jobs run at full Table I sizes with the D5 classifier
stream at 20% (38K -> 7.6K tweets; the candidate distribution is scale-
free, see DESIGN.md).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.hire_ner import HireNER
from repro.core.pipeline import EMDGlobalizer, FittedVariant, build_variant
from repro.eval import paper_numbers as paper
from repro.eval.harness import evaluate_variant
from repro.eval.metrics import score_mentions
from repro.local_emd.aguilar import make_aguilar
from repro.local_emd.bertweet import make_bertweet
from repro.local_emd.np_chunker import NPChunker
from repro.local_emd.twitter_nlp import TwitterNLP
from repro.streams import generator as gen

__all__ = [
    "make_system",
    "fitted_variants",
    "run_table1",
    "run_table2",
    "run_table3",
    "run_table4",
    "run_ablation",
    "run_error_analysis",
]

DEFAULT_D5_SCALE = 0.2


def make_system(name: str):
    """Instantiate one (unfitted) Local EMD system by paper name."""
    voc = gen.default_vocabulary()
    fam = voc.entity_token_familiarity()
    gaz = voc.gazetteer()
    if name == "NP Chunker":
        return NPChunker()
    if name == "TwitterNLP":
        return TwitterNLP(gaz)
    if name == "Aguilar et al.":
        return make_aguilar(fam, gaz)
    if name == "BERTweet":
        return make_bertweet(fam)
    raise ValueError(f"unknown Local EMD system: {name}")


def fitted_variants(
    spark: SparkSession,
    *,
    systems: list | None = None,
    scale: float = 1.0,
    d5_scale: float = DEFAULT_D5_SCALE,
) -> dict:
    """Build (train) the framework variant for each requested system."""
    out: dict = {}
    for name in systems or paper.SYSTEMS:
        out[name] = build_variant(
            spark, make_system(name), scale=scale, d5_scale=d5_scale
        )
    return out


def run_table1(*, scale: float = 1.0) -> pd.DataFrame:
    """Table I: generated dataset statistics vs the paper's legible ones."""
    rows = []
    for name in [*paper.DATASETS, "d5"]:
        st = gen.generate(name, scale=scale).stats()
        st["paper_size"] = paper.TABLE1.get(name, {}).get("size")
        rows.append(st)
    return pd.DataFrame(rows)


def run_table2(variants: dict) -> pd.DataFrame:
    """Table II: Entity Classifier validation F1 per instantiation."""
    rows = []
    for name, v in variants.items():
        rows.append(
            {
                "system": name,
                "emb_size": f"{v.emb_dim}+1",
                "val_f1": round(v.clf_history.get("validation_f1", float("nan")), 3),
                "paper_emb_size": paper.TABLE2[name]["emb_size"],
                "paper_val_f1": paper.TABLE2[name]["val_f1"],
                "pe_val_loss": round(v.pe_history["best_val_loss"], 4)
                if v.pe_history
                else None,
            }
        )
    return pd.DataFrame(rows)


def run_table3(
    spark: SparkSession,
    variants: dict,
    *,
    datasets: list | None = None,
    scale: float = 1.0,
) -> pd.DataFrame:
    """Table III: local vs global effectiveness + times, with paper refs."""
    rows = []
    for ds_name in datasets or paper.DATASETS:
        ds = gen.generate(ds_name, scale=scale)
        for sys_name, variant in variants.items():
            r = evaluate_variant(spark, variant, ds).row()
            ref = paper.TABLE3.get((ds_name, sys_name), {})
            r.update(
                paper_local_F1=ref.get("lF1"),
                paper_global_F1=ref.get("gF1"),
                paper_gain_pct=ref.get("gain"),
            )
            rows.append(r)
    return pd.DataFrame(rows)


def run_table4(
    spark: SparkSession,
    aguilar_variant: FittedVariant,
    *,
    datasets: list | None = None,
    scale: float = 1.0,
    hire_epochs: int = 14,
) -> pd.DataFrame:
    """Table IV: Aguilar-instantiated Globalizer vs HIRE-NER."""
    voc = gen.default_vocabulary()
    hire = HireNER(
        aguilar_variant.system.bank, voc.gazetteer(), epochs=hire_epochs
    )
    train = gen.generate("wnut17_train", scale=scale)
    hire.fit(train.tweets, train.gold)
    rows = []
    for ds_name in datasets or paper.DATASETS:
        ds = gen.generate(ds_name, scale=scale)
        tweets_df = ds.to_spark(spark).cache()
        try:
            res = EMDGlobalizer(aguilar_variant).run(spark, tweets_df)
            glob = score_mentions(res.final_mentions, ds.gold)
            hire_pred = hire.tag(spark, tweets_df).toPandas()
            hire_prf = score_mentions(hire_pred, ds.gold)
        finally:
            tweets_df.unpersist()
        for sys_name, prf in [("EMD Globalizer", glob), ("HIRE-NER", hire_prf)]:
            ref = paper.TABLE4.get((ds_name, sys_name), {})
            rows.append(
                {
                    "dataset": ds_name,
                    "system": sys_name,
                    **prf.row(),
                    "paper_P": ref.get("P"),
                    "paper_R": ref.get("R"),
                    "paper_F1": ref.get("F1"),
                }
            )
    return pd.DataFrame(rows)


def run_ablation(
    spark: SparkSession,
    variant: FittedVariant,
    *,
    datasets: tuple = ("d1", "d2", "d3", "d4"),
    scale: float = 1.0,
) -> pd.DataFrame:
    """Figure 6 as text: F1 per streaming dataset for local-only,
    +mention-extraction, and the full framework."""
    rows = []
    for ds_name in datasets:
        ds = gen.generate(ds_name, scale=scale)
        row = {"dataset": ds_name}
        for ablation in ["local", "mining", "full"]:
            r = evaluate_variant(spark, variant, ds, ablation=ablation)
            row[f"F1_{ablation}"] = round(r.global_.f1, 3)
        rows.append(row)
    return pd.DataFrame(rows)


def run_error_analysis(
    spark: SparkSession,
    variant: FittedVariant,
    *,
    datasets: tuple = ("d1", "d2", "d3", "d4"),
    scale: float = 1.0,
    freq_bin_width: int = 5,
) -> dict:
    """Section VI-C numbers for one variant over the streaming datasets:

    - mentions/entities lost because Local EMD missed *every* mention
      (error class 1: never became a candidate);
    - mentions lost to Entity-Classifier false negatives (error class 2);
    - classifier recall on true entities by mention-frequency bin
      (Figure 7 as text).
    """
    total_mentions = 0
    total_entities: set = set()
    lost1_mentions = 0
    lost1_entities: set = set()
    lost2_mentions = 0
    lost2_entities: set = set()
    bins: dict = {}
    for ds_name in datasets:
        ds = gen.generate(ds_name, scale=scale)
        tweets_df = ds.to_spark(spark).cache()
        try:
            res = EMDGlobalizer(variant).run(spark, tweets_df)
        finally:
            tweets_df.unpersist()
        gold = ds.gold
        total_mentions += len(gold)
        total_entities.update(gold["eid"])
        seed_keys = set(res.candidates["key"]) if len(res.candidates) else set()
        entity_keys = set(
            res.candidates.loc[res.candidates["label"] == "entity", "key"]
        )
        for eid, grp in gold.groupby("eid"):
            key = grp["key"].iloc[0]
            if key not in seed_keys:
                lost1_mentions += len(grp)
                lost1_entities.add((ds_name, eid))
            elif key not in entity_keys:
                lost2_mentions += len(grp)
                lost2_entities.add((ds_name, eid))
            else:
                pass
            if key in seed_keys:
                b = (len(grp) - 1) // freq_bin_width
                hit, tot = bins.get(b, (0, 0))
                bins[b] = (hit + (1 if key in entity_keys else 0), tot + 1)
    return {
        "total_mentions": total_mentions,
        "total_entities": len(total_entities),
        "lost_never_candidate_mentions": lost1_mentions,
        "lost_never_candidate_entities": len(lost1_entities),
        "lost_never_candidate_pct": round(100 * lost1_mentions / total_mentions, 2),
        "lost_classifier_fn_mentions": lost2_mentions,
        "lost_classifier_fn_entities": len(lost2_entities),
        "lost_classifier_fn_pct": round(100 * lost2_mentions / total_mentions, 2),
        "classifier_recall_by_freq_bin": {
            f"{b * freq_bin_width + 1}-{(b + 1) * freq_bin_width}": round(h / t, 3)
            for b, (h, t) in sorted(bins.items())
            if t > 0
        },
        "classifier_recall_by_freq_bin_counts": {
            f"{b * freq_bin_width + 1}-{(b + 1) * freq_bin_width}": t
            for b, (h, t) in sorted(bins.items())
            if t > 0
        },
    }
