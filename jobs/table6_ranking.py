"""Reproduce paper Table VI: EA as a ranking problem on DBP15K —
Hits@1/Hits@10/MRR for the independent matchers and CEAFF w/o C; accuracy
(Hits@1) for collective CEAFF."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import table_main

if __name__ == "__main__":
    table_main("6")
