"""HGNN training substrate (driver-local numpy; see DESIGN.md layering
note): triples→adjacency transformation, RGCN (Eq. 1) with full-batch and
GraphSAINT-style mini-batch training, and a TransE link-prediction
trainer."""
