"""Reproduce paper Table 6: HPEZ speeds with and without fast-varying-
first interpolation (eps=1e-3)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _runner import emit, scale_arg  # noqa: E402

from repro.tables import format_rows, table6_fvfi  # noqa: E402

if __name__ == "__main__":
    scale = scale_arg()
    rows = table6_fvfi(scale)
    emit(f"table6_{scale}", rows, format_rows(rows))
