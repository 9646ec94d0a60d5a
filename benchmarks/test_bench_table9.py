"""Benchmark: reproduce Table 9 (overall Acc/F-1, 13 matchers × 8
datasets) at bench scale."""
from repro.harness import table9


def test_bench_table9(benchmark, bench_harness, emit_result):
    t = benchmark.pedantic(
        lambda: table9(bench_harness), rounds=1, iterations=1
    )
    emit_result("table9", t)
    assert len(t) == 13
    assert t.set_index("Matcher").loc["Dedupe", "Shoes Acc"] == "-"
