"""Reproduce paper Table IV: mono-lingual EA accuracy on DYW100K and
SRPRS (DBP-WD / DBP-YG), including the CEAFF w/o M^l row."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import table_main

if __name__ == "__main__":
    table_main("4")
