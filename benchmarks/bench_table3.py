"""Benchmark: regenerate Table 3 (Direct vs Code+ quality and cost)."""
import pytest

from repro.harness import tables


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(tables.table3, args=(spark, bench_cfg),
                            rounds=1, iterations=1)
    avg = df[df.source == "Average"].iloc[0]
    # the paper's headline claims: Code+ wins on quality AND pays
    # orders of magnitude fewer tokens
    assert avg.code_f1 > avg.direct_f1
    assert avg.reduction > 25
    print("\n" + tables.to_markdown(df))
