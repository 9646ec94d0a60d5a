"""Benchmark: reproduce Table 6 (FacultyMatch fairness) at bench scale."""
from repro.harness import table6


def test_bench_table6(benchmark, bench_harness, emit_result):
    t = benchmark.pedantic(
        lambda: table6(bench_harness), rounds=1, iterations=1
    )
    emit_result("table6", t)
    assert len(t) == 11
    assert "PPV cn" in t.columns
