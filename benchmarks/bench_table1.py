"""Benchmark: Table I regeneration (corpus synthesis + stats)."""
import pytest

from repro.eval.experiments import run_table1


@pytest.mark.benchmark(group="table1")
def test_bench_table1_dataset_generation(benchmark):
    table = benchmark.pedantic(
        lambda: run_table1(scale=0.2), rounds=1, iterations=1
    )
    assert len(table) == 7
    assert (table["n_mentions"] > 0).all()
