"""Benchmark: regenerate Table 5 (alternate LLMs + schema F1@k)."""
import pytest

from repro.harness import tables


@pytest.mark.benchmark(group="table5")
def test_bench_table5(benchmark, spark, bench_cfg):
    df = benchmark.pedantic(tables.table5, args=(spark, bench_cfg),
                            rounds=1, iterations=1)
    by_model = df.set_index("model")
    # paper shape: jumbo collapses on FDA Code+ while enron survives;
    # gpt4 stays competitive
    assert by_model.loc["jumbo", "code_fda"] < 15
    assert by_model.loc["jumbo", "code_enron"] > 60
    assert by_model.loc["gpt4", "code_fda"] > 40
    print("\n" + tables.to_markdown(df))
