"""spark-submit entrypoint reproducing the paper's Table 8."""
from _runner import run_table
from repro.harness import table8

if __name__ == "__main__":
    run_table(table8.run, "Table 8")
