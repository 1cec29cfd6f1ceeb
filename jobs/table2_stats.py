"""Reproduce paper Table II: benchmark statistics of the nine KG pairs
(at our scale, next to the paper's full-scale counts)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import table_main

if __name__ == "__main__":
    table_main("2")
