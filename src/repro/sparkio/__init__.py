"""Spark substrate: distributed block (de)compression over Parquet."""
from .blocks import (  # noqa: F401
    blockwise_error_stats,
    compress_df,
    decompress_df,
    global_error_summary,
    reassemble,
    to_blocks_df,
)
from .store import read_compressed, write_compressed  # noqa: F401
