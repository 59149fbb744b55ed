"""Parallel data-transfer experiment (paper §7.2.4, Table 5, Fig. 14)."""
from .model import (  # noqa: F401
    TransferMeasurement,
    measure_codec,
    search_eps_for_psnr,
    transfer_time,
)
