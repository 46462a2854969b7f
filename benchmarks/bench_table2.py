"""Benchmark: Table II — Entity Classifier training on D5 candidates."""
import pytest

from repro.core.entity_classifier import EntityClassifier
from repro.core.pipeline import candidate_table
from repro.streams import generator as gen


@pytest.mark.benchmark(group="table2")
def test_bench_table2_classifier_training(benchmark, spark, bench_aguilar_variant):
    d5 = gen.generate("d5", scale=0.05)
    df = d5.to_spark(spark).cache()
    try:
        embs, keys, labels, _ = candidate_table(
            spark,
            bench_aguilar_variant.system,
            bench_aguilar_variant.phrase_embedder,
            df,
            set(d5.gold["key"]),
        )
    finally:
        df.unpersist()

    def train():
        clf = EntityClassifier.build(embs.shape[1], seed=6)
        return clf.train(embs, keys, labels, epochs=300, patience=20, seed=6)

    hist = benchmark.pedantic(train, rounds=1, iterations=1)
    assert hist["validation_f1"] > 0.6
