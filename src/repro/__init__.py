"""PySpark reproduction of "Local Algorithms for Hierarchical Dense
Subgraph Discovery" (Sariyüce, Seshadhri, Pinar, VLDB 2018).

Subpackages:
    graph — edge-list substrate, synthetic generators, clique enumeration
    core  — iterated h-index decompositions (SND/AND), peeling baselines,
            degree levels, convergence metrics
"""

__version__ = "0.1.0"
