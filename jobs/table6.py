"""spark-submit entrypoint reproducing the paper's Table 6."""
from _runner import run_table
from repro.harness import table6

if __name__ == "__main__":
    run_table(table6.run, "Table 6")
