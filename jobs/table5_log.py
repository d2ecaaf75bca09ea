"""spark-submit entrypoint for Table 5 (log compression)."""
from _runner import main

from repro.experiments import table5

if __name__ == "__main__":
    main("Table 5 - log compression", table5.run, table5.render)
