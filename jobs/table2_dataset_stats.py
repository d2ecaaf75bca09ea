"""spark-submit entrypoint for Table 2 (dataset statistics)."""
from _runner import main

from repro.experiments import table2

if __name__ == "__main__":
    main("Table 2 - dataset statistics", table2.run, table2.render)
