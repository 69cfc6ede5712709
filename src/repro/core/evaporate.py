"""End-to-end orchestration of the three EVAPORATE implementations.

``run_direct`` lives in ``direct.py``; this module wires the code-path
pipelines: schema synthesis -> candidate generation -> scale-out function
execution (Spark) -> Algorithm-1 aggregation. ``prepare_code`` computes
the shared artifacts once so the Table-4 ablation can re-aggregate the
same votes under MV / WS / WS+Filter / WS+Abstain+Filter without
re-synthesizing anything.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core import aggregate as agg
from repro.core.schema import SchemaResult, sample_doc_ids, synthesize_schema
from repro.core.synthesis import Candidate, generate_candidates
from repro.core.execute import run_functions
from repro.lakes.base import DataLake
from repro.llm.mock_llm import MockLLM
from repro.llm.tokens import TokenLedger

N_SCHEMA_SAMPLE = 10  # docs for schema synthesis + D_eval (paper §4.1)
N_FN_SAMPLE = 5  # docs whose chunks seed function synthesis (§4.4.1)


@dataclass
class RunResult:
    """Structured view + provenance for one pipeline run."""

    mode: str  # "direct" | "code" | "code_plus"
    table: pd.DataFrame  # (doc_id, attribute, value)
    attrs: list[str]
    ledger: TokenLedger
    schema: SchemaResult | None = None
    plans: dict[str, agg.AttrPlan] = field(default_factory=dict)

    @property
    def tokens(self) -> int:
        return self.ledger.total


@dataclass
class CodeArtifacts:
    """Everything the code pipelines share before aggregation."""

    lake: DataLake
    model: str
    seed: int
    attrs: list[str]
    candidates: list[Candidate]
    votes: object  # persisted Spark DataFrame (doc_id, attribute, fid, value)
    votes_all: pd.DataFrame
    votes_eval: pd.DataFrame
    labels: dict[str, dict[str, str]]  # attr -> doc -> LLM F label
    eval_ids: list[str]
    doc_ids: list[str] | None
    ledger: TokenLedger
    schema: SchemaResult | None

    def unpersist(self) -> None:
        self.votes.unpersist()


def prepare_code(
    spark: SparkSession,
    lake: DataLake,
    model: str = "davinci",
    seed: int = 0,
    given_attrs: list[str] | None = None,
    doc_ids: list[str] | None = None,
    n_eval: int = N_SCHEMA_SAMPLE,
    n_fn_docs: int = N_FN_SAMPLE,
) -> CodeArtifacts:
    """Schema (unless ClosedIE), candidates, votes, and D_eval labels."""
    ledger = TokenLedger()
    llm = MockLLM(lake, model, seed)

    schema: SchemaResult | None = None
    if given_attrs is not None:
        attrs = list(given_attrs)
    else:
        schema = synthesize_schema(lake, model, seed, k_sample=N_SCHEMA_SAMPLE)
        ledger.merge(schema.ledger)
        attrs = schema.ranked_attrs[: len(lake.gold_attrs)]

    fn_ids = sample_doc_ids(lake, n_fn_docs)
    candidates: list[Candidate] = []
    for a in attrs:
        candidates.extend(
            generate_candidates(
                lake, a, model=model, seed=seed, sample_ids=fn_ids, ledger=ledger
            )
        )

    eval_ids = sample_doc_ids(lake, n_eval)
    run_ids = None
    if doc_ids is not None:
        run_ids = sorted(set(doc_ids) | set(eval_ids))
    votes = run_functions(spark, lake, candidates, run_ids).persist()
    votes_all = votes.toPandas()
    votes_eval = votes_all[votes_all.doc_id.isin(set(eval_ids))]

    labels = {
        a: agg.eval_labels(lake, llm, a, eval_ids, ledger) for a in attrs
    }
    return CodeArtifacts(
        lake=lake, model=model, seed=seed, attrs=attrs, candidates=candidates,
        votes=votes, votes_all=votes_all, votes_eval=votes_eval, labels=labels,
        eval_ids=eval_ids, doc_ids=doc_ids, ledger=ledger, schema=schema,
    )


def finish_code_plus(
    spark: SparkSession,
    art: CodeArtifacts,
    aggregator: str = "ws_abstain_filter",
    validate: bool = True,
) -> RunResult:
    """Algorithm-1 aggregation on prepared artifacts -> structured view."""
    cfg = agg.AGGREGATORS[aggregator]
    llm = MockLLM(art.lake, art.model, art.seed)
    ledger = TokenLedger().merge(art.ledger)

    plans: dict[str, agg.AttrPlan] = {}
    for a in art.attrs:
        plan = agg.score_and_plan(
            art.lake, a, art.candidates, art.votes_eval, art.labels[a],
            art.votes_all, cfg,
        )
        if validate and plan.alive:
            sample_vals = [
                v for v in art.votes_all[
                    (art.votes_all.attribute == a)
                    & art.votes_all.fid.isin(plan.kept)
                ].value.tolist() if v
            ][:5]
            ok, t = llm.validate_attribute(a, sample_vals)
            ledger.add("validation", t)
            if not ok:
                plan.kept = []
        plans[a] = plan

    votes = art.votes
    if art.doc_ids is not None:
        votes = votes.filter(F.col("doc_id").isin(set(art.doc_ids)))
    table = agg.aggregate_votes_spark(spark, votes, plans, cfg).toPandas()
    return RunResult(
        mode="code_plus", table=table, attrs=[a for a in art.attrs if plans[a].alive],
        ledger=ledger, schema=art.schema, plans=plans,
    )


def run_code_plus(
    spark: SparkSession,
    lake: DataLake,
    model: str = "davinci",
    seed: int = 0,
    given_attrs: list[str] | None = None,
    doc_ids: list[str] | None = None,
    aggregator: str = "ws_abstain_filter",
    validate: bool = True,
) -> RunResult:
    """EVAPORATE-CODE+ end-to-end (§3.3)."""
    art = prepare_code(spark, lake, model, seed, given_attrs, doc_ids)
    try:
        return finish_code_plus(spark, art, aggregator, validate)
    finally:
        art.unpersist()


def run_code(
    spark: SparkSession,
    lake: DataLake,
    model: str = "davinci",
    seed: int = 0,
    given_attrs: list[str] | None = None,
    doc_ids: list[str] | None = None,
) -> RunResult:
    """EVAPORATE-CODE (§3.2): a single synthesized function per attribute,
    no scoring, no filtering, no ensembling."""
    ledger = TokenLedger()
    schema: SchemaResult | None = None
    if given_attrs is not None:
        attrs = list(given_attrs)
    else:
        schema = synthesize_schema(lake, model, seed, k_sample=N_SCHEMA_SAMPLE)
        ledger.merge(schema.ledger)
        attrs = schema.ranked_attrs[: len(lake.gold_attrs)]

    first_doc = sample_doc_ids(lake, 1)
    candidates: list[Candidate] = []
    for a in attrs:
        cands = generate_candidates(
            lake, a, model=model, seed=seed, sample_ids=first_doc,
            styles=("A",), ledger=ledger,
        )
        candidates.extend(cands[:1])

    votes = run_functions(spark, lake, candidates, doc_ids)
    attr_to_fid = {c.attribute: c.fid for c in candidates}
    table = agg.aggregate_single_function(votes, attr_to_fid).toPandas()
    return RunResult(mode="code", table=table, attrs=attrs, ledger=ledger,
                     schema=schema)
