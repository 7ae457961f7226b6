"""spark-submit entrypoint for repro.experiments.exp2_index_size (see DESIGN.md §5)."""
import os, sys
sys.path.insert(0, os.path.dirname(__file__))
from _runner import main
from repro.experiments.exp2_index_size import run

if __name__ == "__main__":
    main(run, "exp2_index_size")
