"""Benchmark: reproduce the paper's Table 9 (prints the rows it measures)."""
from benchmarks._util import run_once

from repro.harness import table9


def test_table9(benchmark, bench_cfg):
    run_once(benchmark, table9.run, bench_cfg)
