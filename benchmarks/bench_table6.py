"""Benchmark: reproduce Table 6 (codebook sizes vs spatial deviation)."""
from benchmarks._util import run_once

from repro.harness import table6


def test_table6(benchmark, bench_cfg):
    run_once(benchmark, table6.run, bench_cfg)
