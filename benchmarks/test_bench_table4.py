"""Benchmark: build Table 4 (dataset overview) at bench scale."""
from repro.harness import table4


def test_bench_table4(benchmark, bench_harness, emit_result):
    t = benchmark.pedantic(
        lambda: table4(bench_harness), rounds=1, iterations=1
    )
    emit_result("table4", t)
    assert len(t) == 8
