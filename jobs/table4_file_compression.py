"""spark-submit entrypoint for Table 4 (file compression)."""
from _runner import main

from repro.experiments import table4

if __name__ == "__main__":
    main("Table 4 - file compression", table4.run, table4.render)
