"""Unit tests for the determinism utilities."""
import numpy as np
import pytest

from repro.util import (hash_choice, hash_rng, hash_uniform, normalize_attr,
                        stable_digest)


class TestStableDigest:
    def test_deterministic(self):
        assert stable_digest("a", 1, "b") == stable_digest("a", 1, "b")

    def test_distinct_inputs_differ(self):
        assert stable_digest("a") != stable_digest("b")

    def test_order_matters(self):
        assert stable_digest("a", "b") != stable_digest("b", "a")

    def test_separator_prevents_collisions(self):
        assert stable_digest("ab", "c") != stable_digest("a", "bc")

    def test_64bit_range(self):
        d = stable_digest("x")
        assert 0 <= d < (1 << 64)

    def test_accepts_non_strings(self):
        assert stable_digest(1, 2.5, None) == stable_digest("1", "2.5", "None")


class TestHashUniform:
    def test_in_unit_interval(self):
        for i in range(100):
            u = hash_uniform("t", i)
            assert 0.0 <= u < 1.0

    def test_deterministic(self):
        assert hash_uniform("k", 7) == hash_uniform("k", 7)

    def test_roughly_uniform(self):
        vals = [hash_uniform("u", i) for i in range(2000)]
        assert abs(np.mean(vals) - 0.5) < 0.03
        assert np.min(vals) < 0.05 and np.max(vals) > 0.95


class TestHashChoice:
    def test_picks_member(self):
        opts = ["a", "b", "c"]
        for i in range(20):
            assert hash_choice(opts, "s", i) in opts

    def test_deterministic(self):
        assert hash_choice([1, 2, 3], "x") == hash_choice([1, 2, 3], "x")

    def test_covers_options(self):
        opts = list(range(5))
        seen = {hash_choice(opts, "cov", i) for i in range(200)}
        assert seen == set(opts)


class TestHashRng:
    def test_same_seed_same_stream(self):
        a = hash_rng("r", 1).integers(0, 1000, 10)
        b = hash_rng("r", 1).integers(0, 1000, 10)
        assert (a == b).all()

    def test_different_seed_differs(self):
        a = hash_rng("r", 1).integers(0, 1000, 10)
        b = hash_rng("r", 2).integers(0, 1000, 10)
        assert not (a == b).all()


class TestNormalizeAttr:
    @pytest.mark.parametrize("raw,expected", [
        ("510(k) Number:", "510(k) number"),
        ("  Device Name  ", "device name"),
        ("DIRECTOR", "director"),
        ("'Title'", "title"),
        ("Release   Date", "release date"),
        ("x-folder", "x-folder"),
        ("Tuition & Fees", "tuition & fees"),
    ])
    def test_cases(self, raw, expected):
        assert normalize_attr(raw) == expected

    def test_idempotent(self):
        for s in ["A B:", "a b", "  C-- "]:
            assert normalize_attr(normalize_attr(s)) == normalize_attr(s)
