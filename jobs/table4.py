"""spark-submit entrypoint reproducing the paper's Table 4."""
from _runner import run_table
from repro.harness import table4

if __name__ == "__main__":
    run_table(table4.run, "Table 4")
