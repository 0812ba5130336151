"""spark-submit entrypoint reproducing Figure 9's compression ratios as a table."""
from _runner import run_table
from repro.harness import fig9

if __name__ == "__main__":
    run_table(fig9.run, "Figure 9 (compression ratios)")
