"""Benchmark: reproduce the paper's Table 4 (prints the rows it measures)."""
from benchmarks._util import run_once

from repro.harness import table4


def test_table4(benchmark, bench_cfg):
    run_once(benchmark, table4.run, bench_cfg)
