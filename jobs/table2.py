"""spark-submit entrypoint reproducing the paper's Table 2."""
from _runner import run_table
from repro.harness import table2

if __name__ == "__main__":
    run_table(table2.run, "Table 2")
