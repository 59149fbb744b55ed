"""Reproduce paper Table 2: execution speeds (MB/s) at eps=1e-3 for all
seven codecs on the six floating-point datasets."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _runner import emit, scale_arg  # noqa: E402

from repro.tables import format_rows, table2_speeds  # noqa: E402

if __name__ == "__main__":
    scale = scale_arg()
    rows = table2_speeds(scale)
    emit(f"table2_{scale}", rows, format_rows(rows))
