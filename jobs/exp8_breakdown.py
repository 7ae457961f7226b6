"""spark-submit entrypoint for repro.experiments.exp8_breakdown (see DESIGN.md §5)."""
import os, sys
sys.path.insert(0, os.path.dirname(__file__))
from _runner import main
from repro.experiments.exp8_breakdown import run

if __name__ == "__main__":
    main(run, "exp8_breakdown")
