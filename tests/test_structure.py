"""Structural substrate: Spark adjacency dataflow (oracle-checked vs
DuckDB and vs the NumPy reference), GCN forward/backward (numerical
gradient check), and training behaviour (loss decreases, alignment beats
chance, dense beats sparse)."""
import numpy as np
import pandas as pd
import pytest

from repro.matching.greedy import independent_top1
from repro.oracle import assert_equivalent
from repro.sim.matrices import cosine_matrix
from repro.structure.adjacency import (
    adjacency_dense,
    adjacency_dense_numpy,
    adjacency_long,
    degrees,
)
from repro.structure.gcn import gcn_backward, gcn_forward, init_params, truncated_normal
from repro.structure.training import (
    GCNConfig,
    margin_loss_and_grads,
    sample_negatives,
    structural_embeddings,
    train_gcn,
)

TRIPLES = pd.DataFrame({"h": [0, 1, 2, 0], "r": [0, 1, 0, 2], "t": [1, 2, 3, 2]})
N = 5  # node 4 is isolated (self-loop only)


# ---- adjacency ----------------------------------------------------------


def test_degrees_oracle(spark):
    got = degrees(spark, TRIPLES, N)
    # degree of A+I = distinct undirected neighbours + self loop
    assert_equivalent(
        got,
        """
        WITH edges AS (
            SELECT h AS i, t AS j FROM triples
            UNION SELECT t AS i, h AS j FROM triples
            UNION SELECT x AS i, x AS j FROM range(5) AS r(x)
        )
        SELECT i, count(*) AS deg FROM edges GROUP BY i
        """,
        triples=TRIPLES,
    )


def test_adjacency_long_oracle(spark):
    got = adjacency_long(spark, TRIPLES, N)
    assert_equivalent(
        got.selectExpr("i", "j", "round(w, 6) AS w"),
        """
        WITH edges AS (
            SELECT h AS i, t AS j FROM triples
            UNION SELECT t AS i, h AS j FROM triples
            UNION SELECT x AS i, x AS j FROM range(5) AS r(x)
        ), deg AS (SELECT i, count(*) AS d FROM edges GROUP BY i)
        SELECT e.i AS i, e.j AS j,
               round(1.0 / sqrt(di.d * dj.d), 6) AS w
        FROM edges e JOIN deg di ON e.i = di.i JOIN deg dj ON e.j = dj.i
        """,
        triples=TRIPLES,
    )


@pytest.mark.parametrize("variant", ["sym", "rw", "mix"])
def test_adjacency_spark_matches_numpy(spark, variant):
    got = adjacency_dense(spark, TRIPLES, N, variant=variant)
    ref = adjacency_dense_numpy(TRIPLES, N, variant=variant)
    np.testing.assert_allclose(got, ref, atol=1e-12)


def test_adjacency_sym_symmetric():
    a = adjacency_dense_numpy(TRIPLES, N, variant="sym")
    np.testing.assert_allclose(a, a.T)


def test_adjacency_rw_row_stochastic():
    a = adjacency_dense_numpy(TRIPLES, N, variant="rw")
    np.testing.assert_allclose(a.sum(axis=1), 1.0)


def test_adjacency_isolated_node_self_loop():
    a = adjacency_dense_numpy(TRIPLES, N)
    assert a[4, 4] == 1.0
    assert a[4, :4].sum() == 0.0


def test_adjacency_unknown_variant_raises(spark):
    with pytest.raises(ValueError):
        adjacency_dense_numpy(TRIPLES, N, variant="bogus")
    with pytest.raises(ValueError):
        adjacency_long(spark, TRIPLES, N, variant="bogus")


def test_adjacency_parallel_edges_collapse():
    dup = pd.concat([TRIPLES, TRIPLES])
    np.testing.assert_allclose(
        adjacency_dense_numpy(dup, N), adjacency_dense_numpy(TRIPLES, N)
    )


# ---- GCN forward/backward ----------------------------------------------


def test_truncated_normal_bounded():
    rng = np.random.default_rng(0)
    x = truncated_normal(rng, (500, 4), std=0.5)
    assert np.abs(x).max() <= 1.0 + 1e-12


def test_init_params_normalized():
    rng = np.random.default_rng(0)
    p = init_params(6, 8, 4, rng)
    np.testing.assert_allclose(np.linalg.norm(p.x1, axis=1), 1.0, atol=1e-12)
    np.testing.assert_allclose(np.linalg.norm(p.x2, axis=1), 1.0, atol=1e-12)
    assert p.w1.shape == (4, 4) and p.w2.shape == (4, 4)


def test_gcn_forward_shapes():
    rng = np.random.default_rng(1)
    a = adjacency_dense_numpy(TRIPLES, N)
    p = init_params(N, N, 3, rng)
    z, cache = gcn_forward(a, p.x1, p.w1, p.w2)
    assert z.shape == (N, 3)
    assert cache["h_pre"].shape == (N, 3)


def test_gcn_gradients_match_numerical():
    rng = np.random.default_rng(2)
    n, d = 6, 3
    a = rng.random((n, n))
    p = init_params(n, n, d, rng)
    dz = rng.standard_normal((n, d))
    _, cache = gcn_forward(a, p.x1, p.w1, p.w2)
    dx, dw1, dw2 = gcn_backward(dz, cache)

    def num_grad(arr):
        g = np.zeros_like(arr)
        eps = 1e-6
        it = np.nditer(arr, flags=["multi_index"])
        for _ in it:
            idx = it.multi_index
            orig = arr[idx]
            arr[idx] = orig + eps
            zp, _ = gcn_forward(a, p.x1, p.w1, p.w2)
            arr[idx] = orig - eps
            zm, _ = gcn_forward(a, p.x1, p.w1, p.w2)
            arr[idx] = orig
            g[idx] = np.sum(dz * (zp - zm)) / (2 * eps)
        return g

    np.testing.assert_allclose(num_grad(p.x1), dx, atol=1e-6)
    np.testing.assert_allclose(num_grad(p.w1), dw1, atol=1e-6)
    np.testing.assert_allclose(num_grad(p.w2), dw2, atol=1e-6)


# ---- margin loss --------------------------------------------------------


def test_margin_loss_zero_when_separated():
    z1 = np.array([[0.0, 0.0], [5.0, 5.0]])
    z2 = np.array([[0.0, 0.0], [5.0, 5.0]])
    pos = np.array([[0, 0]])
    neg = np.array([[0, 0, 1, 1]])  # d_pos=0, d_neg=0 vs (1,1)? both zero
    # distance pos (0,0)=0; neg pair (z1[1], z2[1]) distance 0 → margin active
    loss, dz1, dz2 = margin_loss_and_grads(z1, z2, pos, neg, margin=3.0)
    assert loss == 3.0


def test_margin_loss_inactive():
    z1 = np.array([[0.0, 0.0], [5.0, 5.0]])
    z2 = np.array([[0.0, 0.0], [-5.0, -5.0]])
    pos = np.array([[0, 0]])
    neg = np.array([[0, 0, 1, 1]])  # d_neg = 20 >> margin
    loss, dz1, dz2 = margin_loss_and_grads(z1, z2, pos, neg, margin=3.0)
    assert loss == 0.0
    assert not dz1.any() and not dz2.any()


def test_margin_loss_grad_numerical():
    rng = np.random.default_rng(3)
    z1 = rng.standard_normal((4, 3))
    z2 = rng.standard_normal((4, 3))
    pos = np.array([[0, 0], [1, 1]])
    neg = sample_negatives(rng, pos, 4, 4, 2)
    loss, dz1, dz2 = margin_loss_and_grads(z1, z2, pos, neg, margin=1.0)
    eps = 1e-7
    for arr, grad in ((z1, dz1), (z2, dz2)):
        for idx in [(0, 0), (1, 2), (3, 1)]:
            orig = arr[idx]
            arr[idx] = orig + eps
            lp, *_ = margin_loss_and_grads(z1, z2, pos, neg, margin=1.0)
            arr[idx] = orig - eps
            lm, *_ = margin_loss_and_grads(z1, z2, pos, neg, margin=1.0)
            arr[idx] = orig
            num = (lp - lm) / (2 * eps)
            assert abs(num - grad[idx]) < 1e-4


def test_sample_negatives_shape_and_ranges():
    rng = np.random.default_rng(4)
    pos = np.array([[0, 1], [2, 3]])
    neg = sample_negatives(rng, pos, 10, 20, 5)
    assert neg.shape == (10, 4)
    assert (neg[:, 0] == np.repeat(pos[:, 0], 5)).all()
    assert (neg[:, 2] < 10).all() and (neg[:, 3] < 20).all()
    # exactly one side corrupted per row
    changed = (neg[:, 2] != neg[:, 0]) | (neg[:, 3] != neg[:, 1])
    same_u = neg[:, 2] == neg[:, 0]
    same_v = neg[:, 3] == neg[:, 1]
    assert (same_u | same_v).all()  # never both corrupted
    assert changed.mean() > 0.5  # mostly real corruptions


# ---- training behaviour -------------------------------------------------


@pytest.fixture(scope="module")
def trained(zh_pair_small):
    pair = zh_pair_small
    a1 = adjacency_dense_numpy(pair.kg1.triples, pair.kg1.n_entities)
    a2 = adjacency_dense_numpy(pair.kg2.triples, pair.kg2.n_entities)
    seeds = pair.train[["e1", "e2"]].to_numpy()
    cfg = GCNConfig(epochs=200)
    params, losses = train_gcn(a1, a2, seeds, cfg)
    return pair, a1, a2, seeds, params, losses


@pytest.fixture(scope="module")
def zh_pair_small():
    from repro.kgdata.benchmarks import dataset

    return dataset("dbp15k_zh_en", n_pairs=100)


def test_training_reduces_loss(trained):
    *_, losses = trained
    assert np.mean(losses[-10:]) < 0.2 * losses[0]


def test_training_beats_chance(trained):
    pair, a1, a2, seeds, params, _ = trained
    z1, _ = gcn_forward(a1, params.x1, params.w1, params.w2)
    z2, _ = gcn_forward(a2, params.x2, params.w1, params.w2)
    te1 = pair.test["e1"].to_numpy()
    te2 = pair.test["e2"].to_numpy()
    m = cosine_matrix(z1[te1], z2[te2])
    acc = float(np.mean(independent_top1(m) == np.arange(len(te1))))
    assert acc > 5.0 / len(te1)  # ≥5× chance level


def test_structural_embeddings_deterministic(zh_pair_small):
    pair = zh_pair_small
    a1 = adjacency_dense_numpy(pair.kg1.triples, pair.kg1.n_entities)
    a2 = adjacency_dense_numpy(pair.kg2.triples, pair.kg2.n_entities)
    seeds = pair.train[["e1", "e2"]].to_numpy()
    cfg = GCNConfig(epochs=30)
    za = structural_embeddings(a1, a2, seeds, cfg)
    zb = structural_embeddings(a1, a2, seeds, cfg)
    np.testing.assert_allclose(za[0], zb[0])
    np.testing.assert_allclose(za[1], zb[1])
