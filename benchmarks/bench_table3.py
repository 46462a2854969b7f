"""Benchmark: Table III — one full Local+Global cell per variant type.

Measures the paper's run-time claim directly: the benchmarked callable
returns the harness row whose ``time_overhead_s`` (Global EMD) must be
of the same order as — not a multiple of — the local phase.
"""
import pytest

from repro.eval.harness import evaluate_variant
from repro.streams import generator as gen


@pytest.mark.benchmark(group="table3")
def test_bench_table3_aguilar_d1(benchmark, spark, bench_aguilar_variant):
    ds = gen.generate("d1", scale=0.5)
    row = benchmark.pedantic(
        lambda: evaluate_variant(spark, bench_aguilar_variant, ds),
        rounds=1,
        iterations=1,
    )
    assert row.global_.f1 > row.local.f1


@pytest.mark.benchmark(group="table3")
def test_bench_table3_chunker_d1(benchmark, spark, bench_chunker_variant):
    ds = gen.generate("d1", scale=0.5)
    row = benchmark.pedantic(
        lambda: evaluate_variant(spark, bench_chunker_variant, ds),
        rounds=1,
        iterations=1,
    )
    assert row.global_.f1 > row.local.f1
