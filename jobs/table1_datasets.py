"""Reproduce paper Table 1: dataset inventory (synthetic analogues)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _runner import emit, scale_arg  # noqa: E402

from repro.tables import format_rows, table1_datasets  # noqa: E402

if __name__ == "__main__":
    scale = scale_arg()
    rows = table1_datasets(scale)
    emit(f"table1_{scale}", rows, format_rows(rows))
