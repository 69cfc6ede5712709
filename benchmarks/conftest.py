"""Benchmark configuration: one harness config shared by the per-table
benchmarks (reduced scale so the whole suite stays in minutes)."""
from __future__ import annotations

import pytest

from repro.harness.tables import HarnessConfig


@pytest.fixture(scope="session")
def bench_cfg() -> HarnessConfig:
    return HarnessConfig(n_docs=40, sample_size=10, sites_per_domain=2)
