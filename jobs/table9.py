"""spark-submit entrypoint reproducing the paper's Table 9."""
from _runner import run_table
from repro.harness import table9

if __name__ == "__main__":
    run_table(table9.run, "Table 9")
