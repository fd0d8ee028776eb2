"""The paper's contribution: Query-by-Sketch (labelling, sketching,
guided searching) — Sections 4–5 of the paper."""
