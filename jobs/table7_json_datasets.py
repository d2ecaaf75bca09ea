"""spark-submit entrypoint for Table 7 (per-JSON-dataset ratios)."""
from _runner import main

from repro.experiments import table7

if __name__ == "__main__":
    main("Table 7 - JSON dataset ratios", table7.run, table7.render)
