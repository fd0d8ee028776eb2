"""Baselines the paper compares against: Bi-BFS (search-based), PPL and
ParentPPL (labelling-based, Section 3)."""
