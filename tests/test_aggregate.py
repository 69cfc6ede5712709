"""Tests for Algorithm 1: abstention inference, scoring, filtering,
top-b bucketing and the Spark weighted-vote aggregation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.aggregate import (AGGREGATORS, AggConfig, AttrPlan, _top_b,
                                  aggregate_single_function,
                                  aggregate_votes_spark, eval_labels,
                                  score_and_plan)
from repro.core.synthesis import Candidate
from repro.llm.mock_llm import MockLLM
from repro.llm.tokens import TokenLedger
from repro.oracle import assert_equivalent


def _mk_cands(attr, fids):
    return [Candidate(f, attr, "A", "", "fn") for f in fids]


def _votes(rows):
    return pd.DataFrame(rows, columns=["doc_id", "attribute", "fid", "value"])


class TestAggregators:
    def test_four_configs(self):
        assert set(AGGREGATORS) == {"mv", "ws", "ws_filter", "ws_abstain_filter"}

    def test_baselines_do_not_filter(self):
        assert not AGGREGATORS["mv"].use_filter
        assert not AGGREGATORS["ws"].use_filter
        assert AGGREGATORS["ws_filter"].use_filter
        assert AGGREGATORS["ws_abstain_filter"].use_abstain


class TestEvalLabels:
    def test_labels_for_all_eval_docs(self, fda_lake):
        llm = MockLLM(fda_lake, "davinci")
        ids = sorted(fda_lake.docs.doc_id)[:5]
        led = TokenLedger()
        labels = eval_labels(fda_lake, llm, "applicant", ids, led)
        assert set(labels) == set(ids)
        assert led.by_stage["eval_labels"] > 0

    def test_refusals_mapped_to_empty(self, fda_lake):
        llm = MockLLM(fda_lake, "claude")
        ids = sorted(fda_lake.docs.doc_id)[:10]
        led = TokenLedger()
        for attr in fda_lake.gold_attrs[:4]:
            labels = eval_labels(fda_lake, llm, attr, ids, led)
            from repro.llm.mock_llm import CHATBOT_REFUSAL
            assert CHATBOT_REFUSAL not in labels.values()


class TestScoreAndPlan:
    def test_good_function_kept_bad_filtered(self):
        cands = _mk_cands("a", ["good", "bad"])
        eval_rows = []
        labels = {}
        for i in range(8):
            d = f"d{i}"
            labels[d] = f"v{i}"
            eval_rows.append((d, "a", "good", f"v{i}"))
            eval_rows.append((d, "a", "bad", "junk"))
        votes = _votes(eval_rows)
        plan = score_and_plan(None, "a", cands, votes, labels, votes,
                              AGGREGATORS["ws_abstain_filter"])
        assert "good" in plan.kept and "bad" not in plan.kept
        assert plan.scores["good"] > 0.9 > plan.scores["bad"]

    def test_high_e_scores_where_fired(self):
        """A high-precision/low-recall function survives in the high-e
        regime despite abstaining on most eval docs."""
        cands = _mk_cands("a", ["narrow"])
        labels = {f"d{i}": f"v{i}" for i in range(10)}
        rows = [("d0", "a", "narrow", "v0"), ("d1", "a", "narrow", "v1")]
        rows += [(f"d{i}", "a", "narrow", "") for i in range(2, 10)]
        plan = score_and_plan(None, "a", cands, _votes(rows), labels,
                              _votes(rows), AGGREGATORS["ws_abstain_filter"])
        assert plan.e == 1.0
        assert plan.kept == ["narrow"]  # scored only where it fired

    def test_low_e_empty_votes_count_as_correct(self):
        cands = _mk_cands("a", ["quiet"])
        labels = {f"d{i}": "" for i in range(10)}  # attribute absent
        rows = [(f"d{i}", "a", "quiet", "") for i in range(10)]
        plan = score_and_plan(None, "a", cands, _votes(rows), labels,
                              _votes(rows), AGGREGATORS["ws_abstain_filter"])
        assert plan.e == 0.0
        assert not plan.drop_empty
        assert plan.kept == ["quiet"]  # f1("","") == 1 on every doc

    def test_no_filter_keeps_bad(self):
        cands = _mk_cands("a", ["bad"])
        labels = {f"d{i}": f"v{i}" for i in range(5)}
        rows = [(f"d{i}", "a", "bad", "junk") for i in range(5)]
        plan = score_and_plan(None, "a", cands, _votes(rows), labels,
                              _votes(rows), AGGREGATORS["mv"])
        assert plan.kept == ["bad"]

    def test_top_m_cap(self):
        fids = [f"f{i}" for i in range(15)]
        cands = _mk_cands("a", fids)
        labels = {"d0": "v"}
        rows = [("d0", "a", f, "v") for f in fids]
        cfg = AggConfig(top_m=10)
        plan = score_and_plan(None, "a", cands, _votes(rows), labels,
                              _votes(rows), cfg)
        assert len(plan.kept) == 10

    def test_dead_attribute(self):
        cands = _mk_cands("a", ["f1"])
        labels = {f"d{i}": f"v{i}" for i in range(5)}
        rows = [(f"d{i}", "a", "f1", "wrong") for i in range(5)]
        plan = score_and_plan(None, "a", cands, _votes(rows), labels,
                              _votes(rows), AGGREGATORS["ws_abstain_filter"])
        assert not plan.alive


class TestTopB:
    def test_keeps_top_buckets(self):
        votes = {f"f{i}": "x" for i in range(3)}
        votes.update({"g0": "y", "h0": "z", "h1": "w", "h2": "q"})
        out = _top_b(votes, 2)
        assert set(out.values()) <= {"x", "y", "q", "w", "z"}
        assert all(v == "x" for f, v in out.items() if f.startswith("f"))

    def test_b_larger_than_uniques_keeps_all(self):
        votes = {"a": "x", "b": "y"}
        assert _top_b(votes, 4) == votes


class TestSparkAggregation:
    def test_weighted_vote_picks_heavier(self, spark):
        votes = spark.createDataFrame(_votes([
            ("d1", "a", "f1", "right"), ("d1", "a", "f2", "wrong"),
            ("d1", "a", "f3", "wrong"),
        ]))
        plans = {"a": AttrPlan("a", 1.0, {}, ["f1", "f2", "f3"],
                               {"f1": 5.0, "f2": 1.0, "f3": 1.0}, True)}
        out = aggregate_votes_spark(spark, votes, plans, AggConfig()).toPandas()
        assert out.value.tolist() == ["right"]

    def test_mv_equal_weights_majority(self, spark):
        votes = spark.createDataFrame(_votes([
            ("d1", "a", "f1", "x"), ("d1", "a", "f2", "x"),
            ("d1", "a", "f3", "y"),
        ]))
        plans = {"a": AttrPlan("a", 1.0, {}, ["f1", "f2", "f3"],
                               {"f1": 1.0, "f2": 1.0, "f3": 1.0}, True)}
        out = aggregate_votes_spark(spark, votes, plans, AggConfig(method="mv")).toPandas()
        assert out.value.tolist() == ["x"]

    def test_drop_empty_abstains(self, spark):
        votes = spark.createDataFrame(_votes([
            ("d1", "a", "f1", ""), ("d1", "a", "f2", ""),
            ("d1", "a", "f3", "val"),
        ]))
        plans = {"a": AttrPlan("a", 1.0, {}, ["f1", "f2", "f3"],
                               {f: 1.0 for f in ("f1", "f2", "f3")}, True)}
        out = aggregate_votes_spark(spark, votes, plans, AggConfig()).toPandas()
        assert out.value.tolist() == ["val"]

    def test_keep_empty_can_suppress(self, spark):
        """Low-e regime: empty votes are no-value predictions and can
        outvote a spurious extraction."""
        votes = spark.createDataFrame(_votes([
            ("d1", "a", "f1", ""), ("d1", "a", "f2", ""),
            ("d1", "a", "f3", "halluc"),
        ]))
        plans = {"a": AttrPlan("a", 0.0, {}, ["f1", "f2", "f3"],
                               {f: 1.0 for f in ("f1", "f2", "f3")}, False)}
        out = aggregate_votes_spark(spark, votes, plans, AggConfig()).toPandas()
        assert out.empty  # "" wins the cell and is not emitted

    def test_no_alive_plans_empty_result(self, spark):
        votes = spark.createDataFrame(_votes([("d1", "a", "f1", "x")]))
        plans = {"a": AttrPlan("a", 1.0, {}, [], {}, True)}
        out = aggregate_votes_spark(spark, votes, plans, AggConfig()).toPandas()
        assert out.empty

    def test_matches_duckdb_oracle(self, spark):
        """Oracle: the argmax-by-weight cell winner equals the DuckDB
        window-function equivalent."""
        rows = []
        for d in range(6):
            for f, v in (("f1", "x"), ("f2", "x"), ("f3", f"y{d % 2}")):
                rows.append((f"d{d}", "a", f, v))
        votes_pd = _votes(rows)
        votes = spark.createDataFrame(votes_pd)
        weights = {"f1": 2.0, "f2": 1.0, "f3": 1.5}
        plans = {"a": AttrPlan("a", 1.0, {}, list(weights), weights, True)}
        out = aggregate_votes_spark(spark, votes, plans, AggConfig(b=4))
        weights_pd = pd.DataFrame(
            [(f, w) for f, w in weights.items()], columns=["fid", "weight"])
        assert_equivalent(
            out.select("doc_id", "value"),
            """WITH scored AS (
                 SELECT v.doc_id, v.value, SUM(w.weight) AS s
                 FROM votes v JOIN weights w USING (fid)
                 WHERE v.value <> '' GROUP BY v.doc_id, v.value),
               ranked AS (
                 SELECT doc_id, value,
                        ROW_NUMBER() OVER (PARTITION BY doc_id
                                           ORDER BY s DESC, value ASC) AS rn
                 FROM scored)
               SELECT doc_id, value FROM ranked WHERE rn = 1""",
            votes=votes_pd, weights=weights_pd,
        )


class TestSingleFunction:
    def test_selects_one_fid(self, spark):
        votes = spark.createDataFrame(_votes([
            ("d1", "a", "f1", "x"), ("d1", "a", "f2", "other"),
            ("d2", "a", "f1", ""),
        ]))
        out = aggregate_single_function(votes, {"a": "f1"}).toPandas()
        assert out.value.tolist() == ["x"]  # f2 ignored, empty dropped

    def test_empty_mapping(self, spark):
        votes = spark.createDataFrame(_votes([("d1", "a", "f1", "x")]))
        out = aggregate_single_function(votes, {}).toPandas()
        assert out.empty
