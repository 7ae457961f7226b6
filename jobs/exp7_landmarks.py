"""spark-submit entrypoint for repro.experiments.exp7_landmarks (see DESIGN.md §5)."""
import os, sys
sys.path.insert(0, os.path.dirname(__file__))
from _runner import main
from repro.experiments.exp7_landmarks import run

if __name__ == "__main__":
    main(run, "exp7_landmarks")
