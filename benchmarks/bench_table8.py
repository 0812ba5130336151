"""Benchmark: reproduce the paper's Table 8 (prints the rows it measures)."""
from benchmarks._util import run_once

from repro.harness import table8


def test_table8(benchmark, bench_cfg):
    run_once(benchmark, table8.run, bench_cfg)
