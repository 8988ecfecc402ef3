"""TransE link-prediction trainer: scoring, ranking semantics, filtered
Hits@k, and learnability above the random baseline."""
import numpy as np
import pytest

from repro.gnn.encoding import EncodedLP
from repro.gnn.lp import TransE, hits_at_k, train_transe


def _toy_lp(n_groups=4, per_group=6, seed=0) -> EncodedLP:
    """Persons in group g link to answer vertex a_g via relation 'r'; the
    intra-group 'knows' edges make group membership learnable."""
    rng = np.random.default_rng(seed)
    n_persons = n_groups * per_group
    answers = np.arange(n_persons, n_persons + n_groups)
    persons = np.arange(n_persons)
    group = persons // per_group
    task, knows = [], []
    for p in persons:
        task.append((p, 0, answers[group[p]]))
        for q in rng.choice(per_group, 2):
            other = group[p] * per_group + q
            if other != p:
                knows.append((p, 1, other))
    task = np.array(task)
    rng.shuffle(task)
    n = len(task)
    splits = {
        "train": task[: int(0.7 * n)],
        "valid": task[int(0.7 * n): int(0.85 * n)],
        "test": task[int(0.85 * n):],
    }
    return EncodedLP(
        node_ids=np.arange(n_persons + n_groups),
        rel_names=["r", "knows"],
        triples=np.array(knows, dtype=np.int64),
        task_rel=0,
        splits={k: v.astype(np.int64) for k, v in splits.items()},
        candidates=answers.astype(np.int64),
    )


def test_score_is_negative_l1():
    m = TransE(4, 2, dim=3, seed=0)
    s = m.score(np.array([0]), np.array([1]), np.array([2]))
    expect = -np.abs(m.ent[0] + m.rel[1] - m.ent[2]).sum()
    assert s[0] == pytest.approx(expect)


def test_margin_step_reduces_violation():
    m = TransE(10, 2, dim=8, seed=1)
    batch = np.array([[0, 0, 1]] * 32)
    neg = np.full(32, 2)
    before = m.sgd_margin_step(batch, neg, lr=0.1, margin=2.0)
    for _ in range(30):
        after = m.sgd_margin_step(batch, neg, lr=0.1, margin=2.0)
    assert after < before


def test_entity_norm_bounded():
    m = TransE(10, 2, dim=8, seed=2)
    batch = np.array([[0, 0, 1], [2, 1, 3]])
    for _ in range(10):
        m.sgd_margin_step(batch, np.array([4, 5]), lr=0.5, margin=2.0)
    assert (np.linalg.norm(m.ent, axis=1) <= 1.0 + 1e-9).all()


def test_hits_perfect_embedding_is_one():
    enc = _toy_lp()
    m = TransE(len(enc.node_ids), 2, dim=8, seed=3)
    # plant a perfect embedding: e_o = e_s + r exactly for true answers
    m.ent[:] = 0
    m.rel[:] = 0
    for s, r, o in np.concatenate(list(enc.splits.values())):
        m.ent[o] += 0  # keep answers at origin
        m.ent[s] = np.zeros(8)
    # give each answer a unique corner and move its persons next to it
    for g, a in enumerate(enc.candidates):
        m.ent[a] = np.eye(8)[g]
        for s, r, o in np.concatenate(list(enc.splits.values())):
            if o == a:
                m.ent[s] = m.ent[a]
    assert hits_at_k(m, enc, "test", k=1) == 1.0


def test_hits_random_close_to_k_over_candidates():
    enc = _toy_lp(n_groups=8, per_group=8)
    m = TransE(len(enc.node_ids), 2, dim=8, seed=4)
    h = hits_at_k(m, enc, "test", k=2)
    assert 0 <= h <= 1


def test_filtered_ranking_excludes_known_objects():
    """A competing object that is a known-true (train) answer for the same
    subject must be removed from the candidate list: with it, the test
    answer ranks 2nd (miss at k=1); filtered it ranks 1st (hit)."""
    dim = 4
    # vertices: subject 0, candidates 1 (train answer) and 2 (test answer)
    enc = EncodedLP(
        node_ids=np.arange(3),
        rel_names=["r"],
        triples=np.array([[0, 0, 1]], dtype=np.int64),  # train answer in graph
        task_rel=0,
        splits={
            "train": np.array([[0, 0, 1]], dtype=np.int64),
            "valid": np.empty((0, 3), dtype=np.int64),
            "test": np.array([[0, 0, 2]], dtype=np.int64),
        },
        candidates=np.array([1, 2], dtype=np.int64),
    )
    m = TransE(3, 1, dim=dim, seed=5)
    m.rel[:] = 0
    m.ent[0] = np.zeros(dim)
    m.ent[1] = np.zeros(dim)          # candidate 1 scores best (distance 0)
    m.ent[2] = np.full(dim, 0.1)      # test answer strictly worse
    assert hits_at_k(m, enc, "test", k=1) == 1.0


def test_train_beats_random_baseline():
    enc = _toy_lp(n_groups=16, per_group=8)
    r = train_transe(enc, dim=16, epochs=60, lr=0.01, seed=0)
    h1 = hits_at_k(r["model"], enc, "test", k=1)
    assert h1 > 0.5  # random hits@1 over 16 candidates ≈ 0.06


def test_train_loss_decreases():
    enc = _toy_lp()
    r = train_transe(enc, dim=8, epochs=20, lr=0.1, seed=1)
    assert r["loss_history"][-1] < r["loss_history"][0]


def test_hits_nan_for_empty_split():
    enc = _toy_lp()
    enc.splits["valid"] = np.empty((0, 3), dtype=np.int64)
    m = TransE(len(enc.node_ids), 2, dim=4)
    assert np.isnan(hits_at_k(m, enc, "valid"))
