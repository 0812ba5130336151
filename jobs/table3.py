"""spark-submit entrypoint reproducing the paper's Table 3."""
from _runner import run_table
from repro.harness import table3

if __name__ == "__main__":
    run_table(table3.run, "Table 3")
