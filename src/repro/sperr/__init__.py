"""SPERR-like wavelet codec (paper baseline [27])."""
from .codec import compress, decompress  # noqa: F401
