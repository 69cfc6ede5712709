"""Benchmark: regenerate Table 4 (aggregation ablation)."""
import pytest

from repro.harness import tables


@pytest.mark.benchmark(group="table4")
def test_bench_table4(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(tables.table4, args=(spark, bench_cfg),
                            rounds=1, iterations=1)
    avg = df[df.source == "Average"].iloc[0]
    # paper ordering: Algorithm 1's filtering+abstention beat raw MV/WS
    assert avg.ws_abstain_filter >= avg.ws_filter - 1
    assert avg.ws_filter > avg.mv
    print("\n" + tables.to_markdown(df))
