"""Core sequential primitives of the paper.

``metric``            Euclidean distances, (z-outlier) clustering radii,
                      brute-force optima used as test oracles.
``gmm``               Gonzalez's farthest-first traversal, run incrementally,
                      plus the paper's fixed-size and epsilon-adaptive
                      weighted coreset constructions (the round-1 reducer
                      computation of both MapReduce algorithms).
``outliers_cluster``  Algorithm 1 of the paper: the weighted variant of the
                      Charikar et al. greedy for k-center with outliers.
``search``            Minimum-feasible-radius searches (geometric grid with
                      binary search, and the exact-candidate variant), and the
                      CHARIKARETAL sequential baseline built on them.
"""
from repro.core import gmm, metric, outliers_cluster, search  # noqa: F401
