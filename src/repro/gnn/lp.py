"""Link-prediction trainer (the paper's LP tasks, Def. 2.3).

TransE with margin ranking loss and uniform object corruption — the
embedding model underlying the paper's MorsE-TransE runs — trained on all
edges of the (sub)graph and evaluated with *filtered* Hits@10 over
type-valid candidate objects: for each test triple ⟨s, p_T, o⟩ the score
of every candidate completing ⟨s, p_T, ?⟩ is ranked, known-true objects
other than ``o`` removed.
"""
from __future__ import annotations

import numpy as np

from repro.gnn.encoding import EncodedLP


class TransE:
    """Entity/relation embeddings with ``score = -||e_s + r_p - e_o||_1``."""

    def __init__(self, n_entities: int, n_rels: int, dim: int = 32, seed: int = 0):
        rng = np.random.default_rng(seed)
        b = 6.0 / np.sqrt(dim)
        self.ent = rng.uniform(-b, b, (n_entities, dim))
        self.rel = rng.uniform(-b, b, (n_rels, dim))
        self._normalize_rel()

    def _normalize_rel(self):
        self.rel /= np.maximum(np.linalg.norm(self.rel, axis=1, keepdims=True), 1e-9)

    @property
    def n_params(self) -> int:
        return int(self.ent.size + self.rel.size)

    def score(self, s: np.ndarray, r: np.ndarray, o: np.ndarray) -> np.ndarray:
        return -np.abs(self.ent[s] + self.rel[r] - self.ent[o]).sum(axis=1)

    def sgd_margin_step(
        self,
        batch: np.ndarray,
        neg_o: np.ndarray,
        lr: float,
        margin: float,
    ) -> float:
        """One margin-ranking step: ``max(0, margin - pos + neg)`` with the
        L1 score; subgradients applied to the three embedding rows."""
        s, r, o = batch[:, 0], batch[:, 1], batch[:, 2]
        d_pos = self.ent[s] + self.rel[r] - self.ent[o]
        d_neg = self.ent[s] + self.rel[r] - self.ent[neg_o]
        pos = np.abs(d_pos).sum(axis=1)
        neg = np.abs(d_neg).sum(axis=1)
        viol = margin + pos - neg > 0
        loss = float(np.maximum(0.0, margin + pos - neg).mean())
        if viol.any():
            sv, rv, ov, nv = s[viol], r[viol], o[viol], neg_o[viol]
            gp = np.sign(d_pos[viol])  # d loss / d (e_s + r_p - e_o)
            gn = np.sign(d_neg[viol])
            # classic TransE: per-example SGD step (np.add.at accumulates
            # when one entity appears in several violated examples)
            np.add.at(self.ent, sv, -lr * (gp - gn))
            np.add.at(self.rel, rv, -lr * (gp - gn))
            np.add.at(self.ent, ov, lr * gp)
            np.add.at(self.ent, nv, -lr * gn)
        # entity normalization as in TransE
        norms = np.linalg.norm(self.ent, axis=1, keepdims=True)
        np.divide(self.ent, np.maximum(norms, 1.0), out=self.ent)
        return loss


def hits_at_k(model: TransE, enc: EncodedLP, split: str, *, k: int = 10) -> float:
    """Filtered Hits@k for ⟨s, p_T, ?⟩ over the type-valid candidates."""
    test = enc.splits[split]
    if len(test) == 0:
        return float("nan")
    known: dict[int, set] = {}
    for arr in list(enc.splits.values()) + [enc.triples[enc.triples[:, 1] == enc.task_rel]]:
        for s, _, o in arr:
            known.setdefault(int(s), set()).add(int(o))
    cand = enc.candidates
    cand_emb = model.ent[cand]
    hits = 0
    for s, r, o in test:
        d = np.abs(model.ent[s] + model.rel[r] - cand_emb).sum(axis=1)
        scores = -d
        true_score = scores[cand == o]
        if len(true_score) == 0:
            continue
        others = known.get(int(s), set()) - {int(o)}
        valid = ~np.isin(cand, list(others)) if others else np.ones(len(cand), dtype=bool)
        rank = 1 + int((scores[valid] > true_score[0]).sum())
        hits += rank <= k
    return hits / len(test)


def train_transe(
    enc: EncodedLP,
    *,
    dim: int = 32,
    epochs: int = 30,
    batch_size: int = 2048,
    lr: float = 0.01,
    margin: float = 2.0,
    seed: int = 0,
) -> dict:
    """Train on all graph triples (held-out task triples already removed by
    the encoder); report filtered Hits@10 on the task's valid/test splits."""
    rng = np.random.default_rng(seed)
    model = TransE(enc.n_nodes, enc.n_rels, dim=dim, seed=seed)
    triples = np.concatenate([enc.triples, enc.splits["train"]], axis=0)
    history = []
    for _ in range(epochs):
        perm = rng.permutation(len(triples))
        ep_loss = 0.0
        for i in range(0, len(perm), batch_size):
            batch = triples[perm[i : i + batch_size]]
            neg_o = rng.integers(0, enc.n_nodes, len(batch))
            ep_loss += model.sgd_margin_step(batch, neg_o, lr, margin)
        history.append(ep_loss)
    return {
        "model": model,
        "loss_history": history,
        "hits@10": {s: hits_at_k(model, enc, s) for s in ("valid", "test")},
        "n_params": model.n_params,
    }
