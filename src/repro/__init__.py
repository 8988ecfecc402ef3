"""PySpark reproduction of KG-TOSA (Abdallah et al., ICDE 2024):
task-oriented subgraph extraction for HGNN training on large KGs.

Subpackages: ``kg`` (benchmark substrate), ``tasks`` (Table II registry +
splits), ``core`` (the paper's extraction methods), ``metrics`` (Table III
quality indicators), ``gnn`` (RGCN/SAINT/TransE training substrate),
``bench`` (per-table harnesses). See DESIGN.md.
"""
