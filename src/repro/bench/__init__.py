"""Benchmark harness: one row-builder module per paper table
(Tables 1–3 + the Figs 9–11 landmark sweep, tabulated)."""
