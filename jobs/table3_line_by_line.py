"""spark-submit entrypoint for Table 3 (line-by-line compression)."""
from _runner import main

from repro.experiments import table3

if __name__ == "__main__":
    main("Table 3 - line-by-line compression", table3.run, table3.render)
