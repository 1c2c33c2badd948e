"""Graph substrate: synthetic generators, bounded BFS, query workloads."""
