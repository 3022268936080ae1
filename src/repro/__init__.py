"""PySpark reproduction of "Integrating Connection Search in Graph
Queries" (Anadiotis, Manolescu, Mohanty — ICDE 2023).

Subpackages: ``graph`` (data model + benchmark generators), ``core``
(the §4 CTP search algorithms, GAM..MoLESP), ``lang`` (EQL AST/parser),
``eql`` (the §3 evaluation strategy on Spark), ``baselines`` (§5.2
system substitutes), ``experiments`` (one module per evaluation table).
See DESIGN.md and EXPERIMENTS.md at the repo root.
"""
