"""RGCN (Eq. 1): exact-gradient verification against numerical
differentiation, parameter accounting, frozen target embeddings, and
learnability on a toy relational task."""
import numpy as np
import pytest

from repro.gnn.encoding import EncodedGraph, RelEdges
from repro.gnn.rgcn import RGCN, _agg, train_full


def _toy_graph(n=12, n_classes=3, seed=0) -> EncodedGraph:
    """Targets 0..5 each point to a class vertex via relation 'sig'; class
    vertex identity determines the label. Relation 'noise' adds clutter."""
    rng = np.random.default_rng(seed)
    labels = np.full(n, -1)
    sig_src, sig_dst = [], []
    for i in range(6):
        c = i % n_classes
        labels[i] = c
        sig_src.append(i)
        sig_dst.append(6 + c)  # class vertices 6,7,8
    noise_src = rng.integers(0, n, 10)
    noise_dst = rng.integers(0, n, 10)

    def norm(dst):
        _, inv, cnt = np.unique(dst, return_inverse=True, return_counts=True)
        return 1.0 / cnt[inv]

    sig_src, sig_dst = np.array(sig_src), np.array(sig_dst)
    edges = [
        RelEdges(sig_src, sig_dst, norm(sig_dst)),
        RelEdges(sig_dst, sig_src, norm(sig_src)),  # reverse: class → target
        RelEdges(noise_src, noise_dst, norm(noise_dst)),
    ]
    masks = {
        "train": np.zeros(n, bool),
        "valid": np.zeros(n, bool),
        "test": np.zeros(n, bool),
    }
    masks["train"][:4] = True
    masks["test"][4:6] = True
    return EncodedGraph(
        node_ids=np.arange(n),
        rel_names=["sig", "sig_rev", "noise"],
        edges=edges,
        labels=labels,
        masks=masks,
        n_classes=n_classes,
        target_mask=labels >= 0,
    )


def test_numerical_gradient_check():
    """Every analytic gradient entry must match central differences."""
    enc = _toy_graph()
    model = RGCN(enc, dim=4, seed=1)
    idx = np.flatnonzero(enc.masks["train"])
    _, grads = model.loss_and_grads(idx)
    eps = 1e-6
    rng = np.random.default_rng(0)
    for key in ("E", "W1s", "W1r", "W2s", "W2r"):
        flat = model.params[key].reshape(-1)
        gflat = grads[key].reshape(-1)
        for pos in rng.choice(len(flat), size=min(12, len(flat)), replace=False):
            if key == "E" and enc.target_mask.reshape(-1)[pos // model.dim]:
                continue  # frozen rows carry zero gradient by design
            orig = flat[pos]
            flat[pos] = orig + eps
            lp, _ = model.loss_and_grads(idx)
            flat[pos] = orig - eps
            lm, _ = model.loss_and_grads(idx)
            flat[pos] = orig
            num = (lp - lm) / (2 * eps)
            assert num == pytest.approx(gflat[pos], rel=1e-3, abs=1e-6), key


def test_agg_matches_dense_reference():
    enc = _toy_graph()
    d = 4
    rng = np.random.default_rng(2)
    H = rng.normal(size=(enc.n_nodes, d))
    Wself = rng.normal(size=(d, d))
    Wrel = rng.normal(size=(enc.n_rels, d, d))
    got = _agg(H, Wself, Wrel, enc.edges)
    ref = H @ Wself
    for r, e in enumerate(enc.edges):
        for s, t, w in zip(e.src, e.dst, e.norm):
            ref[t] += w * (H[s] @ Wrel[r])
    np.testing.assert_allclose(got, ref, rtol=1e-10)


def test_param_count_formula():
    enc = _toy_graph()
    model = RGCN(enc, dim=8)
    n, r, c, d = enc.n_nodes, enc.n_rels, enc.n_classes, 8
    assert model.n_params == n * d + d * d + r * d * d + d * c + r * d * c


def test_target_embeddings_frozen_at_zero():
    enc = _toy_graph()
    model = RGCN(enc, dim=4, seed=3)
    assert (model.params["E"][enc.target_mask] == 0).all()
    idx = np.flatnonzero(enc.masks["train"])
    for _ in range(5):
        _, grads = model.loss_and_grads(idx)
        model.adam_step(grads)
    assert (model.params["E"][enc.target_mask] == 0).all()
    assert (model.params["E"][~enc.target_mask] != 0).any()


def test_training_reduces_loss():
    enc = _toy_graph()
    result = train_full(enc, epochs=50, dim=8, lr=0.05, seed=0)
    assert result["loss_history"][-1] < result["loss_history"][0]


def test_learns_toy_relational_task():
    """Labels are determined by the class vertex one hop away — a correct
    RGCN must reach 100% train and test accuracy."""
    enc = _toy_graph()
    result = train_full(enc, epochs=120, dim=8, lr=0.05, seed=0)
    assert result["accuracy"]["train"] == 1.0
    assert result["accuracy"]["test"] == 1.0


def test_accuracy_nan_for_empty_split():
    enc = _toy_graph()
    enc.masks["valid"][:] = False
    model = RGCN(enc, dim=4)
    assert np.isnan(model.accuracy("valid"))


def test_forward_shape():
    enc = _toy_graph()
    model = RGCN(enc, dim=4)
    assert model.forward().shape == (enc.n_nodes, enc.n_classes)


def test_deterministic_in_seed():
    enc = _toy_graph()
    a = train_full(enc, epochs=10, dim=4, seed=5)["loss_history"]
    b = train_full(enc, epochs=10, dim=4, seed=5)["loss_history"]
    assert a == b
