"""Graph substrate: synthetic generators, the 12-dataset registry,
Table-1 statistics, and the distributed (DataFrame-join) BFS engine."""
