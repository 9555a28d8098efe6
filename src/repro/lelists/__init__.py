"""LE-lists via the BGSS batched multi-BFS (paper Sec. 5.2)."""
