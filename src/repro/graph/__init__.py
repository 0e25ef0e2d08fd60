"""Graph substrate: synthetic dataset generators (Table I stand-ins) and
edge-DataFrame operations (reverse graph, vertex sampling, adjacency)."""
