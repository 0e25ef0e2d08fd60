"""PySpark reproduction of "Batch Hop-Constrained s-t Simple Path Query
Processing in Large Graphs" (ICDE 2024).

Packages: ``graph`` (synthetic datasets + graph ops), ``core`` (index,
enumeration engine, the paper's Algorithms 1-4), ``baselines`` (adapted
k-shortest-path competitors), ``harness`` (experiment runners for every
evaluation table). See DESIGN.md for the paper→Spark mapping.
"""
