"""Fig 6d — hybrid vs global barrier, 64 SSSP on BW (M1) (paper-vs-measured in EXPERIMENTS.md)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import run_table

if __name__ == "__main__":
    run_table("T6")
