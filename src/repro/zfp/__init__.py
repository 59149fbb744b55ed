"""ZFP-like transform codec (paper baseline [33])."""
from .codec import compress, decompress  # noqa: F401
