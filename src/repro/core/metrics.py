"""Evaluation metrics: Pair F1 (OpenIE), Text F1 (ClosedIE), schema F1@k.

Pair F1 follows Lockard et al. / Deng et al.: the prediction and gold
are sets of (doc_id, attribute, value) tuples; all three elements must
match exactly for credit. Text F1 is the SQuAD token-overlap F1.
Both are computed over Spark DataFrames with joins/aggregations (and are
oracle-checked against DuckDB in the tests).
"""
from __future__ import annotations

import re
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class PRF:
    """Precision / recall / F1 triple (fractions in [0, 1])."""

    precision: float
    recall: float
    f1: float

    @staticmethod
    def from_counts(n_correct: int, n_pred: int, n_gold: int) -> "PRF":
        p = n_correct / n_pred if n_pred else 0.0
        r = n_correct / n_gold if n_gold else 0.0
        f = 2 * p * r / (p + r) if (p + r) else 0.0
        return PRF(p, r, f)


def _norm_tuple_col(df: DataFrame, col: str) -> DataFrame:
    """Whitespace-normalize a string column for exact-match comparison."""
    return df.withColumn(col, F.trim(F.regexp_replace(F.col(col), r"\s+", " ")))


def pair_f1(pred: DataFrame, gold: DataFrame) -> PRF:
    """Pair F1 between predicted and gold (doc_id, attribute, value) sets.

    Empty-string predicted values are dropped (a "no value" prediction is
    the absence of a tuple). Attribute names are compared after
    normalization (lowercase/trim), values after whitespace collapse —
    exact match otherwise, no partial credit.
    """
    cols = ["doc_id", "attribute", "value"]

    def canon(df: DataFrame) -> DataFrame:
        df = df.select(*cols).na.drop(subset=["value"])
        df = df.filter(F.length(F.trim(F.col("value"))) > 0)
        df = df.withColumn("attribute", F.lower(F.trim(F.col("attribute"))))
        df = _norm_tuple_col(df, "value")
        return df.dropDuplicates(cols)

    p, g = canon(pred), canon(gold)
    n_pred = p.count()
    n_gold = g.count()
    n_correct = p.join(g, on=cols, how="inner").count()
    return PRF.from_counts(n_correct, n_pred, n_gold)


_TOKEN_RE = re.compile(r"[A-Za-z0-9]+")


def text_f1_strings(pred: str | None, gold: str | None) -> float:
    """SQuAD-style token F1 between two strings (both-empty -> 1.0)."""
    pt = _TOKEN_RE.findall((pred or "").lower())
    gt = _TOKEN_RE.findall((gold or "").lower())
    if not pt and not gt:
        return 1.0
    if not pt or not gt:
        return 0.0
    common: dict[str, int] = {}
    for t in gt:
        common[t] = common.get(t, 0) + 1
    overlap = 0
    for t in pt:
        if common.get(t, 0) > 0:
            overlap += 1
            common[t] -= 1
    if overlap == 0:
        return 0.0
    p = overlap / len(pt)
    r = overlap / len(gt)
    return 2 * p * r / (p + r)


def closed_text_f1(pred: DataFrame, gold: DataFrame, attrs: list[str],
                   all_doc_ids: list[str]) -> float:
    """Mean Text F1 over every (doc, attribute) cell of the closed schema.

    Cells where both sides are empty score 1.0 (correctly predicting "no
    value"); one-sided empties score 0. Computed with a full outer join
    over the (doc x attribute) grid.
    """
    pp = pred.toPandas() if isinstance(pred, DataFrame) else pred
    gp = gold.toPandas() if isinstance(gold, DataFrame) else gold
    pmap = {(r.doc_id, str(r.attribute).lower()): r.value for r in pp.itertuples()}
    gmap = {(r.doc_id, str(r.attribute).lower()): r.value for r in gp.itertuples()}
    scores = [
        text_f1_strings(pmap.get((d, a.lower())), gmap.get((d, a.lower())))
        for d in all_doc_ids
        for a in attrs
    ]
    return float(pd.Series(scores).mean()) if scores else 0.0


def schema_f1_at_k(pred_attrs: list[str], gold_attrs: list[str]) -> float:
    """F1@k between predicted and gold attribute sets, k = |gold|."""
    k = len(gold_attrs)
    pred = [a.lower().strip() for a in pred_attrs[:k]]
    gold = {a.lower().strip() for a in gold_attrs}
    n_correct = len(set(pred) & gold)
    return PRF.from_counts(n_correct, len(pred), len(gold)).f1
