"""HPEZ core: interpolation engine, auto-tuning, quantization, coding."""
