"""PySpark reproduction of "Bipartite Graph Matching Algorithms for
Clean-Clean Entity Resolution: An Empirical Evaluation" (EDBT 2022).

Subpackages:
  core        the 8 matching algorithms, distributed execution, metrics,
              threshold-sweep protocol
  simgraph    similarity-graph construction (representation models x
              similarity measures, paper Sec. 4)
  datasets    synthetic analogues of the paper's 10 CCER datasets
  experiments runner, cleaning rules, table builders, baselines
  analysis    Friedman / Nemenyi statistics
"""
