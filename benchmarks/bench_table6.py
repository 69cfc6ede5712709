"""Benchmark: regenerate Table 6 (QA span-extractor ClosedIE baseline)."""
import pytest

from repro.harness import tables


@pytest.mark.benchmark(group="table6")
def test_bench_table6(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(tables.table6, args=(spark, bench_cfg),
                            rounds=1, iterations=1)
    # paper: span extractors land mid-range, well below Evaporate ClosedIE
    assert df.closed_f1.between(20, 80).all()
    print("\n" + tables.to_markdown(df))
