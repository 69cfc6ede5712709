"""Tests for Pair F1, Text F1 and schema F1@k — including DuckDB oracle
checks of the Spark join that counts correct tuples."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.metrics import (PRF, closed_text_f1, pair_f1, schema_f1_at_k,
                                text_f1_strings)
from repro.oracle import assert_equivalent


def _df(spark, rows):
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["doc_id", "attribute", "value"]))


class TestPRF:
    def test_from_counts(self):
        prf = PRF.from_counts(5, 10, 20)
        assert prf.precision == 0.5 and prf.recall == 0.25
        assert prf.f1 == pytest.approx(1 / 3)

    def test_zero_denominators(self):
        assert PRF.from_counts(0, 0, 0).f1 == 0.0


class TestPairF1:
    def test_perfect(self, spark):
        rows = [("d1", "a", "x"), ("d2", "b", "y")]
        prf = pair_f1(_df(spark, rows), _df(spark, rows))
        assert prf.f1 == 1.0

    def test_no_partial_credit_on_value(self, spark):
        pred = [("d1", "a", "x extra")]
        gold = [("d1", "a", "x")]
        assert pair_f1(_df(spark, pred), _df(spark, gold)).f1 == 0.0

    def test_attribute_name_must_match(self, spark):
        pred = [("d1", "director details", "x")]
        gold = [("d1", "director", "x")]
        assert pair_f1(_df(spark, pred), _df(spark, gold)).f1 == 0.0

    def test_attribute_case_insensitive(self, spark):
        pred = [("d1", "Director", "x")]
        gold = [("d1", "director", "x")]
        assert pair_f1(_df(spark, pred), _df(spark, gold)).f1 == 1.0

    def test_empty_prediction_dropped(self, spark):
        pred = [("d1", "a", ""), ("d1", "b", "y")]
        gold = [("d1", "b", "y")]
        assert pair_f1(_df(spark, pred), _df(spark, gold)).f1 == 1.0

    def test_precision_recall_split(self, spark):
        pred = [("d1", "a", "x"), ("d1", "junk", "z")]
        gold = [("d1", "a", "x"), ("d1", "b", "y")]
        prf = pair_f1(_df(spark, pred), _df(spark, gold))
        assert prf.precision == 0.5 and prf.recall == 0.5

    def test_whitespace_normalized(self, spark):
        pred = [("d1", "a", "x   y")]
        gold = [("d1", "a", "x y")]
        assert pair_f1(_df(spark, pred), _df(spark, gold)).f1 == 1.0

    def test_duplicates_deduped(self, spark):
        pred = [("d1", "a", "x"), ("d1", "a", "x")]
        gold = [("d1", "a", "x")]
        prf = pair_f1(_df(spark, pred), _df(spark, gold))
        assert prf.precision == 1.0

    def test_counting_join_matches_duckdb(self, spark):
        """Oracle: the tuple-intersection count Spark computes equals the
        equivalent DuckDB SQL over the same inputs."""
        pred = pd.DataFrame(
            [("d1", "a", "x"), ("d1", "b", "wrong"), ("d2", "a", "x2"),
             ("d2", "junk", "j")], columns=["doc_id", "attribute", "value"])
        gold = pd.DataFrame(
            [("d1", "a", "x"), ("d1", "b", "y"), ("d2", "a", "x2")],
            columns=["doc_id", "attribute", "value"])
        p, g = spark.createDataFrame(pred), spark.createDataFrame(gold)
        joined = (
            p.join(g, on=["doc_id", "attribute", "value"], how="inner")
            .groupBy("doc_id").agg(F.count("*").alias("n_correct"))
        )
        assert_equivalent(
            joined,
            """SELECT p.doc_id AS doc_id, COUNT(*) AS n_correct
               FROM pred p JOIN gold g USING (doc_id, attribute, value)
               GROUP BY p.doc_id""",
            pred=pred, gold=gold,
        )


class TestTextF1:
    @pytest.mark.parametrize("pred,gold,expected", [
        ("exact match", "exact match", 1.0),
        ("", "", 1.0),
        ("", "value", 0.0),
        ("value", "", 0.0),
        ("completely different", "other thing", 0.0),
    ])
    def test_cases(self, pred, gold, expected):
        assert text_f1_strings(pred, gold) == pytest.approx(expected)

    def test_partial_overlap(self):
        f1 = text_f1_strings("new york city", "new york")
        assert 0.7 < f1 < 0.9  # 2 common tokens: p=2/3, r=1 -> 0.8

    def test_case_insensitive(self):
        assert text_f1_strings("Class II", "class ii") == 1.0

    def test_punctuation_tokenized(self):
        assert text_f1_strings("K123456", "k123456") == 1.0

    def test_none_handled(self):
        assert text_f1_strings(None, None) == 1.0
        assert text_f1_strings(None, "x") == 0.0

    def test_repeated_tokens_counted_once(self):
        assert text_f1_strings("a a a", "a") < 1.0


class TestClosedTextF1:
    def test_perfect_grid(self, spark):
        pred = pd.DataFrame([("d1", "a", "x")], columns=["doc_id", "attribute", "value"])
        gold = pred.copy()
        assert closed_text_f1(pred, gold, ["a"], ["d1"]) == 1.0

    def test_missing_cell_counts_against(self):
        pred = pd.DataFrame(columns=["doc_id", "attribute", "value"])
        gold = pd.DataFrame([("d1", "a", "x")], columns=["doc_id", "attribute", "value"])
        assert closed_text_f1(pred, gold, ["a"], ["d1"]) == 0.0

    def test_both_absent_scores_one(self):
        pred = pd.DataFrame(columns=["doc_id", "attribute", "value"])
        gold = pd.DataFrame(columns=["doc_id", "attribute", "value"])
        assert closed_text_f1(pred, gold, ["a"], ["d1"]) == 1.0

    def test_averages_over_grid(self):
        pred = pd.DataFrame([("d1", "a", "x")], columns=["doc_id", "attribute", "value"])
        gold = pd.DataFrame([("d1", "a", "x"), ("d1", "b", "y")],
                            columns=["doc_id", "attribute", "value"])
        assert closed_text_f1(pred, gold, ["a", "b"], ["d1"]) == 0.5


class TestSchemaF1:
    def test_perfect(self):
        assert schema_f1_at_k(["a", "b"], ["a", "b"]) == 1.0

    def test_truncates_at_k(self):
        assert schema_f1_at_k(["a", "b", "c"], ["a", "b"]) == 1.0

    def test_partial(self):
        assert schema_f1_at_k(["a", "x"], ["a", "b"]) == 0.5

    def test_case_insensitive(self):
        assert schema_f1_at_k(["A"], ["a"]) == 1.0

    def test_empty_pred(self):
        assert schema_f1_at_k([], ["a"]) == 0.0
