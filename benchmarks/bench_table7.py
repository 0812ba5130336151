"""Benchmark: reproduce the paper's Table 7 (prints the rows it measures)."""
from benchmarks._util import run_once

from repro.harness import table7


def test_table7(benchmark, bench_cfg):
    run_once(benchmark, table7.run, bench_cfg)
