"""Benchmark: reproduce the paper's Table 3 (prints the rows it measures)."""
from benchmarks._util import run_once

from repro.harness import table3


def test_table3(benchmark, bench_cfg):
    run_once(benchmark, table3.run, bench_cfg)
