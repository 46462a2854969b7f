"""Benchmark fixtures: small-but-faithful fitted variants.

Benchmarks measure the pipeline's run-time behaviour (the Table III
execution-time columns and each table harness end to end) at reduced
scale; rounds are kept at 1 because each run is seconds-long and
deterministic.
"""
from __future__ import annotations

import pytest

from repro.core.pipeline import build_variant
from repro.eval.experiments import make_system

BENCH_SCALE = 0.3
BENCH_D5_SCALE = 0.05


@pytest.fixture(scope="session")
def bench_aguilar_variant(spark):
    return build_variant(
        spark, make_system("Aguilar et al."), scale=BENCH_SCALE, d5_scale=BENCH_D5_SCALE
    )


@pytest.fixture(scope="session")
def bench_chunker_variant(spark):
    return build_variant(
        spark, make_system("NP Chunker"), scale=BENCH_SCALE, d5_scale=BENCH_D5_SCALE
    )
