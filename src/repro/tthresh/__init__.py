"""TTHRESH-like HOSVD codec (paper baseline [7])."""
from .codec import compress, decompress  # noqa: F401
