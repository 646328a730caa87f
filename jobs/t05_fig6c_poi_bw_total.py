"""Fig 6c — summed latency, 384 POI on BW (paper-vs-measured in EXPERIMENTS.md)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _session import run_table

if __name__ == "__main__":
    run_table("T5")
