"""GraphSAINT-style mini-batch RGCN training (paper §II-B).

Each epoch samples a subgraph with an in-memory random-walk sampler —
uniform roots ("urw", GraphSAINT's default) or target-biased roots
("brw", the paper's Algorithm 1 used as a per-epoch sampler) — and takes
one RGCN step on the induced edge subset, supervising only the training
vertices that landed in the sample. This reproduces the paper's key
training dynamic: with uniform sampling over the full graph, few target
vertices appear per batch (Fig. 2), so a fixed epoch budget converges
slower than the same trainer on KG'.

The in-memory sampler intentionally mirrors the distributed extractors in
``repro.core`` at the scale GraphSAINT itself operates (per-epoch, on the
already-loaded adjacency).
"""
from __future__ import annotations

import numpy as np

from repro.gnn.encoding import EncodedGraph, RelEdges
from repro.gnn.rgcn import RGCN


def _walk_sample(
    enc: EncodedGraph, roots: np.ndarray, h: int, rng: np.random.Generator
) -> np.ndarray:
    """Visited-vertex set of length-``h`` uniform walks from ``roots``."""
    indptr, nbrs = enc.csr()
    visited = [roots]
    frontier = roots
    for _ in range(h):
        degs = indptr[frontier + 1] - indptr[frontier]
        alive = degs > 0
        frontier = frontier[alive]
        degs = degs[alive]
        if len(frontier) == 0:
            break
        pick = indptr[frontier] + (rng.random(len(frontier)) * degs).astype(np.int64)
        frontier = nbrs[pick]
        visited.append(frontier)
    return np.unique(np.concatenate(visited))


def _induced_edges(enc: EncodedGraph, nodes: np.ndarray) -> list[RelEdges]:
    """Per-relation edges with both endpoints in ``nodes`` (global ids kept,
    so model parameters stay shared across epochs)."""
    mask = np.zeros(enc.n_nodes, dtype=bool)
    mask[nodes] = True
    out = []
    for e in enc.edges:
        keep = mask[e.src] & mask[e.dst]
        out.append(RelEdges(src=e.src[keep], dst=e.dst[keep], norm=e.norm[keep]))
    return out


def train_saint(
    enc: EncodedGraph,
    *,
    sampler: str = "urw",
    epochs: int = 30,
    roots_per_epoch: int = 200,
    walk_h: int = 2,
    dim: int = 32,
    lr: float = 1e-2,
    seed: int = 0,
    record_curve: bool = False,
) -> dict:
    """Mini-batch training; ``sampler`` is "urw" (uniform roots) or "brw"
    (roots drawn from labelled training targets). Returns final split
    accuracies, loss history and (optionally) a per-epoch test-accuracy
    curve (the convergence analysis of the paper's Fig. 9)."""
    if sampler not in ("urw", "brw"):
        raise ValueError(f"unknown sampler {sampler!r}")
    rng = np.random.default_rng(seed)
    model = RGCN(enc, dim=dim, seed=seed)
    train_idx = np.flatnonzero(enc.masks["train"])
    root_pool = np.arange(enc.n_nodes) if sampler == "urw" else train_idx
    history, curve = [], []
    for _ in range(epochs):
        roots = rng.choice(root_pool, min(roots_per_epoch, len(root_pool)), replace=False)
        nodes = _walk_sample(enc, roots, walk_h, rng)
        edges = _induced_edges(enc, nodes)
        in_sample = np.zeros(enc.n_nodes, dtype=bool)
        in_sample[nodes] = True
        batch_idx = train_idx[in_sample[train_idx]]
        if len(batch_idx) == 0:
            history.append(float("nan"))
            if record_curve:
                curve.append(model.accuracy("test"))
            continue
        loss, grads = model.loss_and_grads(batch_idx, edges=edges)
        model.adam_step(grads, lr=lr)
        history.append(loss)
        if record_curve:
            curve.append(model.accuracy("test"))
    logits = model.forward()
    return {
        "model": model,
        "loss_history": history,
        "curve": curve,
        "accuracy": {s: model.accuracy(s, logits) for s in ("train", "valid", "test")},
        "n_params": model.n_params,
    }
