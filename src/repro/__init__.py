"""Reproduction of Sultana & Li, "Continuous Monitoring of Pareto
Frontiers on Partially Ordered Attributes for Many Users" (EDBT 2018).

Subpackages: ``posets`` (strict-partial-order + CPS substrate),
``datasets`` (paper examples + synthetic movie/publication stand-ins),
``core`` (the paper's algorithms), ``dataflow`` (Spark SQL + Structured
Streaming layer), ``experiments`` (evaluation-table harnesses).
"""
