"""spark-submit entrypoint reproducing the paper's Table 5."""
from _runner import run_table
from repro.harness import table5

if __name__ == "__main__":
    run_table(table5.run, "Table 5")
