"""Reproduce paper Table V: the 12-configuration ablation grid
(w/o features / AFF / collective / θ-override, plus the LR baseline) on
SRPRS and DBP15K ZH-EN."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import table_main

if __name__ == "__main__":
    table_main("5")
