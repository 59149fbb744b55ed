"""Synthetic analogues of the paper's evaluation datasets (Table 1)."""
from .fields import (  # noqa: F401
    BENCH_SHAPES,
    DATASETS,
    FP_DATASETS,
    INT_DATASETS,
    TEST_SHAPES,
    generate,
)
