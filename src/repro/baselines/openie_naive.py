"""OpenIE6-style sentence-level triple extractor (Appendix C.1 baseline).

Kolluru et al.'s system labels well-formed sentences with linguistic
features and emits (subject, predicate, object) triples. On
semi-structured documents it floods: hundreds of unnormalized triples
per document, no attribute prioritization, no cross-document
consistency. This stand-in reproduces that behaviour with a light
grammar over sentence-shaped text: every "<NP> <verb> <rest>" span
becomes a triple.
"""
from __future__ import annotations

import re

import pandas as pd

from repro.lakes.base import DataLake

_VERBS = r"(?:is|are|was|were|provides|includes|finds|answers|shows|reports|contains|modified|rose|occurs)"
_SENT = re.compile(r"([A-Za-z][A-Za-z0-9 ,()'\-]{2,60}?)\s+(" + _VERBS + r")\s+([A-Za-z0-9][^.<\n]{2,80})")


def extract_triples(text: str, max_triples: int = 500) -> list[tuple[str, str, str]]:
    """All (subject, predicate, object) spans found in sentence-like text."""
    out = []
    plain = re.sub(r"<[^>]+>", " ", text)  # markup confuses the parser; strip
    for m in _SENT.finditer(plain):
        out.append((m.group(1).strip(), m.group(2), m.group(3).strip()))
        if len(out) >= max_triples:
            break
    return out


def run_openie_baseline(lake: DataLake) -> pd.DataFrame:
    """Triples over the lake as (doc_id, attribute, value) with the
    predicate+subject collapsed into an 'attribute' — the shape an
    analyst would have to work with."""
    rows = []
    for r in lake.docs.itertuples():
        for s, p, o in extract_triples(r.text):
            rows.append((r.doc_id, f"{s} {p}".lower(), o))
    return pd.DataFrame(rows, columns=["doc_id", "attribute", "value"])
