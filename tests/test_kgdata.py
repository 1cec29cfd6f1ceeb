"""The synthetic KG-pair benchmark substrate: determinism, split integrity,
profile shapes (density, scripts, embedding noise/OOV), Table II plumbing."""
import numpy as np
import pandas as pd
import pytest

from repro.kgdata.benchmarks import (
    BENCHMARKS,
    CROSS_LINGUAL,
    LANGS,
    MONO_LINGUAL,
    PAPER_N_PAIRS,
    dataset,
    spec,
)
from repro.kgdata.generator import (
    ALPHABETS,
    KGPairSpec,
    LanguageProfile,
    StructureProfile,
    generate_pair,
)

N = 80


@pytest.fixture(scope="module")
def pairs():
    return {name: dataset(name, n_pairs=N) for name in BENCHMARKS}


# ---- generic invariants over all nine benchmarks ------------------------


@pytest.mark.parametrize("name", BENCHMARKS)
def test_links_are_bijection(pairs, name):
    p = pairs[name]
    assert p.links["e1"].is_unique and p.links["e2"].is_unique
    assert len(p.links) == N


@pytest.mark.parametrize("name", BENCHMARKS)
def test_split_partitions_links(pairs, name):
    p = pairs[name]
    merged = pd.concat([p.train, p.test]).sort_values(["e1", "e2"]).reset_index(drop=True)
    full = p.links.sort_values(["e1", "e2"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(merged, full)


@pytest.mark.parametrize("name", BENCHMARKS)
def test_seed_ratio(pairs, name):
    p = pairs[name]
    assert len(p.train) == round(0.3 * N)


@pytest.mark.parametrize("name", BENCHMARKS)
def test_entity_ids_dense(pairs, name):
    p = pairs[name]
    for kg in (p.kg1, p.kg2):
        assert sorted(kg.names["id"]) == list(range(kg.n_entities))
        assert kg.triples["h"].between(0, kg.n_entities - 1).all()
        assert kg.triples["t"].between(0, kg.n_entities - 1).all()


@pytest.mark.parametrize("name", BENCHMARKS)
def test_no_self_loops(pairs, name):
    p = pairs[name]
    assert (p.kg1.triples["h"] != p.kg1.triples["t"]).all()
    assert (p.kg2.triples["h"] != p.kg2.triples["t"]).all()


@pytest.mark.parametrize("name", BENCHMARKS)
def test_deterministic(name):
    a = dataset(name, n_pairs=40)
    b = dataset(name, n_pairs=40)
    pd.testing.assert_frame_equal(a.kg1.triples, b.kg1.triples)
    pd.testing.assert_frame_equal(a.kg2.names, b.kg2.names)
    pd.testing.assert_frame_equal(a.train, b.train)
    pd.testing.assert_frame_equal(a.emb1, b.emb1)


@pytest.mark.parametrize("name", BENCHMARKS)
def test_seed_offset_changes_data(name):
    a = dataset(name, n_pairs=40)
    b = dataset(name, n_pairs=40, seed_offset=100)
    assert not a.kg1.triples.equals(b.kg1.triples)


@pytest.mark.parametrize("name", BENCHMARKS)
def test_stats_shape(pairs, name):
    s = pairs[name].stats()
    assert s["n_links"] == N
    assert s["n_seed"] + s["n_test"] == N
    assert s["kg1_triples"] > 0 and s["kg2_triples"] > 0
    assert name in PAPER_N_PAIRS


# ---- profile-specific shapes --------------------------------------------


def test_groups_cover_benchmarks():
    assert set(CROSS_LINGUAL) | set(MONO_LINGUAL) == set(BENCHMARKS)
    assert not set(CROSS_LINGUAL) & set(MONO_LINGUAL)


def test_dbp15k_has_extra_entities(pairs):
    p = pairs["dbp15k_zh_en"]
    assert p.kg1.n_entities > N and p.kg2.n_entities > N


def test_srprs_no_extra_entities(pairs):
    p = pairs["srprs_en_fr"]
    assert p.kg1.n_entities == N and p.kg2.n_entities == N


def test_scripts_disjoint_for_zh_en(pairs):
    p = pairs["dbp15k_zh_en"]
    chars1 = set("".join(p.kg1.names["name"])) - {" "}
    chars2 = set("".join(p.kg2.names["name"])) - {" "}
    assert not chars1 & chars2


def test_scripts_shared_for_en_fr(pairs):
    p = pairs["srprs_en_fr"]
    chars1 = set("".join(p.kg1.names["name"])) - {" "}
    chars2 = set("".join(p.kg2.names["name"])) - {" "}
    assert chars1 & chars2


def test_monolingual_names_mostly_identical(pairs):
    p = pairs["dyw100k_dbp_wd"]
    n1 = p.kg1.names.set_index("id")["name"]
    n2 = p.kg2.names.set_index("id")["name"]
    same = sum(n1[a] == n2[b] for a, b in zip(p.links["e1"], p.links["e2"]))
    assert same / len(p.links) > 0.5


def test_crosslingual_latin_names_differ_but_overlap(pairs):
    p = pairs["srprs_en_fr"]
    n1 = p.kg1.names.set_index("id")["name"]
    n2 = p.kg2.names.set_index("id")["name"]
    same = sum(n1[a] == n2[b] for a, b in zip(p.links["e1"], p.links["e2"]))
    assert same < len(p.links)  # char divergence must mutate some names


def test_powerlaw_more_skewed_than_dense():
    dense = dataset("dyw100k_dbp_wd", n_pairs=300)
    sparse = dataset("srprs_dbp_wd", n_pairs=300)

    def gini(kg):
        deg = np.bincount(
            np.concatenate([kg.triples["h"], kg.triples["t"]]), minlength=kg.n_entities
        )
        deg = np.sort(deg)
        n = len(deg)
        return float(
            (2 * np.arange(1, n + 1) - n - 1).dot(deg) / (n * deg.sum())
        )

    assert gini(sparse.kg1) > gini(dense.kg1) + 0.05


def test_embedding_tables_unit_norm(pairs):
    for name in ("dbp15k_zh_en", "srprs_en_fr"):
        p = pairs[name]
        for emb in (p.emb1, p.emb2):
            vecs = np.array(emb["vector"].tolist())
            assert np.allclose(np.linalg.norm(vecs, axis=1), 1.0, atol=1e-6)


def test_oov_rate_materializes():
    prof_hi = LanguageProfile("hi_oov", "latin", oov_rate=0.6)
    prof_lo = LanguageProfile("lo_oov", "latin", oov_rate=0.0)
    base = spec("srprs_en_fr", n_pairs=150)
    hi = generate_pair(
        KGPairSpec(**{**base.__dict__, "name": "hi", "lang1": prof_hi, "lang2": prof_lo})
    )
    # lang2 with zero OOV keeps (almost) every distinct surface token.
    toks2 = {t for nm in hi.kg2.names["name"] for t in nm.split()}
    assert set(hi.emb2["token"]) == toks2
    toks1 = {t for nm in hi.kg1.names["name"] for t in nm.split()}
    assert len(hi.emb1) < 0.7 * len(toks1)


def test_higher_noise_lowers_translation_cosine():
    def mean_translation_cos(noise: float) -> float:
        l1 = LanguageProfile("a_l", "latin", emb_noise=noise, oov_rate=0.0)
        l2 = LanguageProfile("b_l", "latin", emb_noise=noise, oov_rate=0.0)
        base = spec("srprs_en_fr", n_pairs=150)
        p = generate_pair(
            KGPairSpec(**{**base.__dict__, "name": "nz", "lang1": l1, "lang2": l2})
        )
        t1 = {t: np.array(v) for t, v in zip(p.emb1["token"], p.emb1["vector"])}
        t2 = {t: np.array(v) for t, v in zip(p.emb2["token"], p.emb2["vector"])}
        # identical rendering (char_div 0) → shared surface forms
        shared = sorted(set(t1) & set(t2))
        return float(np.mean([t1[t] @ t2[t] for t in shared]))

    assert mean_translation_cos(0.05) > mean_translation_cos(0.6) + 0.1


def test_unknown_structure_kind_raises():
    bad = StructureProfile(kind="nope")
    s = spec("srprs_en_fr", n_pairs=20)
    with pytest.raises(ValueError, match="structure kind"):
        generate_pair(KGPairSpec(**{**s.__dict__, "structure": bad}))


def test_alphabets_are_disjoint():
    seen = {}
    for script, alpha in ALPHABETS.items():
        assert len(alpha) == 26
        for other, oa in seen.items():
            assert not set(alpha) & set(oa), (script, other)
        seen[script] = alpha


def test_language_profiles_registered():
    assert set(LANGS) >= {"en", "fr", "de", "zh", "ja", "dbp", "wd", "yg"}
    assert LANGS["zh"].script == "hanzi" and LANGS["ja"].script == "kana"


def test_spark_views_roundtrip(spark, pairs):
    p = pairs["srprs_en_fr"]
    assert p.kg1.spark_triples(spark).count() == p.kg1.n_triples
    assert p.kg2.spark_names(spark).count() == p.kg2.n_entities
    assert p.spark_train(spark).count() == len(p.train)
    assert p.spark_test(spark).count() == len(p.test)
