"""Benchmark configuration.

Each table harness is a substantial end-to-end experiment, so benchmarks
run one round via ``benchmark.pedantic`` and stash the produced table on
``benchmark.extra_info`` -- ``bench_output.txt`` then carries both the
timings and the reproduced rows that EXPERIMENTS.md quotes.

Scale: env var ``REPRO_BENCH_SCALE`` (default ``bench``; set ``quick`` or
``tiny`` for a fast smoke pass).
"""
from __future__ import annotations

import os

import pytest

from repro.harness import config


@pytest.fixture(scope="session")
def bench_cfg():
    return config.get(os.environ.get("REPRO_BENCH_SCALE", "bench"))
