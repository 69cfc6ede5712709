"""Benchmark: regenerate Table 7 (direct LLM F ClosedIE quality/cost)."""
import pytest

from repro.harness import tables


@pytest.mark.benchmark(group="table7")
def test_bench_table7(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(tables.table7, args=(spark, bench_cfg),
                            rounds=1, iterations=1)
    avg = df[df.source == "Average"].iloc[0]
    # paper: the LLM F is a strong closed extractor (avg 79.9 F1)
    assert avg.f1 > 60
    print("\n" + tables.to_markdown(df))
