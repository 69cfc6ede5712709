"""Benchmark: regenerate Table 1 (Code+ ClosedIE/OpenIE per source)."""
import pytest

from repro.harness import tables


@pytest.mark.benchmark(group="table1")
def test_bench_table1(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(tables.table1, args=(spark, bench_cfg),
                            rounds=1, iterations=1)
    avg = df[df.source == "Average"].iloc[0]
    # paper shape: ClosedIE well above OpenIE, both substantial
    assert avg.closed_f1 > avg.open_f1 > 40
    print("\n" + tables.to_markdown(df))
