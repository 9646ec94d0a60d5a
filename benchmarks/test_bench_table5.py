"""Benchmark: reproduce Table 5 (NoFlyCompas fairness) at bench scale."""
from repro.harness import table5


def test_bench_table5(benchmark, bench_harness, emit_result):
    t = benchmark.pedantic(
        lambda: table5(bench_harness), rounds=1, iterations=1
    )
    emit_result("table5", t)
    assert len(t) == 11
    assert "TPR African-American" in t.columns
