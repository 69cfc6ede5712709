"""Deterministic hashing utilities.

Every stochastic decision in the reproduction (noise events, corruption
choices, sampling) is a pure function of a tuple of string parts via
SHA-256. This keeps results identical across runs, partitionings, and
executors — Python's builtin ``hash`` is salted per-process and must not
be used for this.
"""
from __future__ import annotations

import hashlib

import numpy as np


def stable_digest(*parts: object) -> int:
    """64-bit integer digest of the parts, stable across processes."""
    h = hashlib.sha256("␟".join(str(p) for p in parts).encode("utf-8"))
    return int.from_bytes(h.digest()[:8], "big")


def hash_uniform(*parts: object) -> float:
    """Uniform [0, 1) deterministic in the parts."""
    return stable_digest(*parts) / float(1 << 64)


def hash_choice(options, *parts: object):
    """Deterministically pick one element of ``options``."""
    return options[stable_digest(*parts) % len(options)]


def hash_rng(*parts: object) -> np.random.Generator:
    """NumPy generator seeded deterministically from the parts."""
    return np.random.default_rng(stable_digest(*parts))


def normalize_attr(label: str) -> str:
    """Canonicalize an attribute surface form for comparison/ranking.

    Lowercases, strips punctuation commonly attached to field labels
    (colons, dots, quotes, brackets) and collapses whitespace. E.g.
    ``"510(k) Number:"`` -> ``"510(k) number"``.
    """
    s = label.strip().lower()
    s = s.strip(" :.\"'-_\t")
    s = " ".join(s.split())
    return s
