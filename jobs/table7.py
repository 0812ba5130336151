"""spark-submit entrypoint reproducing the paper's Table 7."""
from _runner import run_table
from repro.harness import table7

if __name__ == "__main__":
    run_table(table7.run, "Table 7")
