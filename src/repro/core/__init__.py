"""The paper's algorithms: distance index (multi-source BFS), batched path
enumeration with ⊕ concatenation, query similarity/clustering (Alg 2),
sharing-graph detection (Alg 3), and the PathEnum/BasicEnum/BatchEnum
drivers (Algs 1 and 4)."""
