"""Reproduction of HPEZ (QoZ 2.0), SIGMOD 2024 — see DESIGN.md."""
