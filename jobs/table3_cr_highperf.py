"""Reproduce paper Table 3: compression ratios of the high-performance
codecs (SZ3, ZFP, QoZ, HPEZ) at eps in {1e-2, 1e-3, 1e-4}, plus the
HPEZ improvement over the best baseline."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _runner import emit, scale_arg  # noqa: E402

from repro.tables import format_rows, table3_cr_highperf  # noqa: E402

if __name__ == "__main__":
    scale = scale_arg()
    rows = table3_cr_highperf(scale)
    emit(f"table3_{scale}", rows, format_rows(rows))
