"""Reproduce paper Table 4: compression ratios of HPEZ vs the high-ratio
codecs (SPERR, FAZ, TTHRESH)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _runner import emit, scale_arg  # noqa: E402

from repro.tables import format_rows, table4_cr_highratio  # noqa: E402

if __name__ == "__main__":
    scale = scale_arg()
    rows = table4_cr_highratio(scale)
    emit(f"table4_{scale}", rows, format_rows(rows))
