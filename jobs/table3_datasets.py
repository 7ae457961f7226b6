"""spark-submit entrypoint for the Table III dataset-statistics analog."""
import os, sys
sys.path.insert(0, os.path.dirname(__file__))
from _runner import main
from repro.experiments.table3_datasets import run

if __name__ == "__main__":
    def _run(spark, codes=None, scale=0.5):
        return run(spark, scale=scale)
    main(_run, "table3_datasets")
