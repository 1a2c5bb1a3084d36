"""PySpark reproduction of "Generalized Supervised Meta-blocking" (VLDB 2022).

Subpackages: ``er_data`` (synthetic ER datasets), ``blocking`` (token
blocking pipeline), ``features`` (weighting schemes), ``classifier``
(logistic regression substrate), ``core`` (the paper's pruning algorithms
and pipeline), ``eval`` (metrics + per-table harnesses). See DESIGN.md.
"""
