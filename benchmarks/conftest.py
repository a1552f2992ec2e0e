"""Benchmark fixtures: datasets at bench scale (SF~0.1 analogue).

``REPRO_BENCH_GROUPS`` scales the synthetic financial datasets (default
600 groups ≈ 2.6K company records); the real-like and WDC datasets run at
the paper's own sizes scaled down only via this env too.
"""
import os

import pytest

from repro.tables.common import load_datasets

BENCH_GROUPS = int(os.environ.get("REPRO_BENCH_GROUPS", "600"))


@pytest.fixture(scope="session")
def bench_datasets(spark):
    return load_datasets(
        spark,
        n_groups_synth=BENCH_GROUPS,
        n_groups_real=min(1500, BENCH_GROUPS),
        n_wdc_records=1000,
    )
