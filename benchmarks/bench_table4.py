"""Benchmark: Table IV — Globalizer vs HIRE-NER on one stream."""
import pytest

from repro.eval.experiments import run_table4


@pytest.mark.benchmark(group="table4")
def test_bench_table4_vs_hire_ner(benchmark, spark, bench_aguilar_variant):
    table = benchmark.pedantic(
        lambda: run_table4(
            spark, bench_aguilar_variant, datasets=["d1"], scale=0.3, hire_epochs=6
        ),
        rounds=1,
        iterations=1,
    )
    t = table.set_index("system")
    assert t.loc["EMD Globalizer", "F1"] > t.loc["HIRE-NER", "F1"]
