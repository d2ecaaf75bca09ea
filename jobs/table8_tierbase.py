"""spark-submit entrypoint for Table 8 (TierBase case study)."""
from _runner import main

from repro.experiments import table8

if __name__ == "__main__":
    main("Table 8 - TierBase case study", table8.run, table8.render)
