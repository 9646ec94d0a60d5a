"""Benchmark: reproduce Table 7 (threshold sensitivity) at bench scale."""
from repro.harness import table7


def test_bench_table7(benchmark, bench_harness, emit_result):
    t = benchmark.pedantic(
        lambda: table7(bench_harness), rounds=1, iterations=1
    )
    emit_result("table7", t)
    assert len(t) == 8  # 2 measures x 4 datasets
