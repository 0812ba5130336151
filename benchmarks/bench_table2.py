"""Benchmark: reproduce the paper's Table 2 (prints the rows it measures)."""
from benchmarks._util import run_once

from repro.harness import table2


def test_table2(benchmark, bench_cfg):
    run_once(benchmark, table2.run, bench_cfg)
