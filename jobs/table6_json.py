"""spark-submit entrypoint for Table 6 (JSON compression)."""
from _runner import main

from repro.experiments import table6

if __name__ == "__main__":
    main("Table 6 - JSON compression", table6.run, table6.render)
