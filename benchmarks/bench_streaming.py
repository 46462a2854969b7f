"""Benchmark: incremental Structured Streaming pipeline throughput."""
import pytest

from repro.streaming.job import StreamingGlobalizer, write_stream_batches
from repro.streams import generator as gen


@pytest.mark.benchmark(group="streaming")
def test_bench_streaming_microbatches(benchmark, spark, bench_aguilar_variant, tmp_path):
    ds = gen.generate("d1", scale=0.3)
    write_stream_batches(ds, str(tmp_path), n_batches=3)

    def run():
        sg = StreamingGlobalizer(bench_aguilar_variant)
        sg.run_file_stream(spark, str(tmp_path))
        return sg

    sg = benchmark.pedantic(run, rounds=1, iterations=1)
    assert sum(o.n_tweets for o in sg.outputs) == len(ds.tweets)
