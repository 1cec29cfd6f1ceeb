"""Reproduce paper Table III: cross-lingual EA accuracy — CEAFF vs the
ten competitor proxies on DBP15K (ZH/JA/FR-EN) and SRPRS (EN-FR/EN-DE)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import table_main

if __name__ == "__main__":
    table_main("3")
