"""FAZ-like hybrid codec (paper baseline [36])."""
from .codec import compress, decompress  # noqa: F401
