"""TransE-family baselines: training mechanics, both coupling modes,
bootstrapping and path augmentation machinery."""
import numpy as np
import pytest

from repro.baselines.transe import (
    TransEConfig,
    _mutual_nn_pairs,
    _sample_paths,
    transe_similarity,
)
from repro.matching.greedy import independent_top1


def _acc(pair, cfg):
    m = transe_similarity(pair, cfg).m
    return float(np.mean(independent_top1(m) == np.arange(m.shape[0])))


@pytest.fixture(scope="module")
def dense_pair():
    from repro.kgdata.benchmarks import dataset

    return dataset("dbp15k_zh_en", n_pairs=100)


def test_mapping_mode_beats_chance(dense_pair):
    acc = _acc(dense_pair, TransEConfig(mode="mapping"))
    n = len(dense_pair.test)
    assert acc > 5.0 / n


def test_shared_mode_beats_chance(dense_pair):
    acc = _acc(dense_pair, TransEConfig(mode="shared"))
    n = len(dense_pair.test)
    assert acc > 5.0 / n


def test_shared_beats_mapping(dense_pair):
    """Seed merging couples the spaces more tightly than a post-hoc linear
    map — the IPTransE-over-MTransE ordering from the paper."""
    assert _acc(dense_pair, TransEConfig(mode="shared")) > _acc(
        dense_pair, TransEConfig(mode="mapping")
    )


def test_training_epochs_help(dense_pair):
    weak = _acc(dense_pair, TransEConfig(mode="shared", epochs=3))
    strong = _acc(dense_pair, TransEConfig(mode="shared", epochs=200))
    assert strong > weak


def test_deterministic(dense_pair):
    cfg = TransEConfig(mode="shared", epochs=30)
    a = transe_similarity(dense_pair, cfg).m
    b = transe_similarity(dense_pair, cfg).m
    np.testing.assert_allclose(a, b)


def test_unknown_mode_raises(dense_pair):
    with pytest.raises(ValueError):
        transe_similarity(dense_pair, TransEConfig(mode="bogus"))


def test_bootstrap_runs_and_returns_valid_matrix(dense_pair):
    cfg = TransEConfig(mode="shared", epochs=60, bootstrap_rounds=2,
                       bootstrap_epochs=20, bootstrap_one_to_one=True)
    m = transe_similarity(dense_pair, cfg).m
    n = len(dense_pair.test)
    assert m.shape == (n, n)
    assert np.isfinite(m).all()


def test_path_augment_runs(dense_pair):
    cfg = TransEConfig(mode="shared", epochs=30, path_augment=True, n_paths=200)
    m = transe_similarity(dense_pair, cfg).m
    assert np.isfinite(m).all()


# ---- helpers ------------------------------------------------------------


def test_sample_paths_composites():
    rng = np.random.default_rng(0)
    triples = np.array([[0, 1, 1], [1, 2, 2], [2, 3, 3]], dtype=np.int64)
    paths = _sample_paths(rng, triples, 50, n_rel=4, n_comp=8)
    assert len(paths) > 0
    assert (paths[:, 1] >= 4).all() and (paths[:, 1] < 12).all()
    assert (paths[:, 0] != paths[:, 2]).all()


def test_sample_paths_empty():
    rng = np.random.default_rng(0)
    out = _sample_paths(rng, np.empty((0, 3), dtype=np.int64), 10, 4, 8)
    assert out.shape == (0, 3)


def test_mutual_nn_pairs_threshold():
    sim = np.array([[0.9, 0.1], [0.2, 0.5]])
    assert _mutual_nn_pairs(sim, 0.95, False) == []
    assert set(_mutual_nn_pairs(sim, 0.4, False)) == {(0, 0), (1, 1)}


def test_mutual_nn_pairs_one_to_one():
    # rows 0 and 1 both prefer col 0; mutual-NN keeps only (0,0), while
    # greedy one-to-one re-routes row 1 nowhere (col 0 is taken, and row
    # best is the only candidate per row).
    sim = np.array([[0.9, 0.05], [0.8, 0.1]])
    assert _mutual_nn_pairs(sim, 0.0, False) == [(0, 0)]
    assert _mutual_nn_pairs(sim, 0.0, True) == [(0, 0)]
    # non-mutual row-best pairs are admitted by the aggressive variant:
    # row 1's best (1,1) is not column 1's best (that is (0,1)=0.85) so
    # mutual-NN drops it, greedy one-to-one keeps it.
    sim2 = np.array([[0.9, 0.85], [0.2, 0.8]])
    assert _mutual_nn_pairs(sim2, 0.0, False) == [(0, 0)]
    assert _mutual_nn_pairs(sim2, 0.0, True) == [(0, 0), (1, 1)]
