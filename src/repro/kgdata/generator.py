"""Latent-world two-view KG pair generator.

A single latent "world" (entities, a vocabulary of latent words, a latent
edge multiset) is sampled; each KG is an independent noisy *view* of it:

- **structure**: each KG keeps each latent edge with probability
  ``edge_keep`` and adds random noise edges, so equivalent entities have
  similar-but-not-identical neighbourhoods (what the GCN feature exploits).
- **names / string**: each latent word is a sequence of alphabet indices;
  a language renders it through its script's alphabet, then applies per-char
  mutations with probability ``char_divergence``. Languages sharing a script
  (EN/FR/DE, or DBpedia/Wikidata/YAGO) overlap at character level; distinct
  scripts (ZH/JA vs EN) have zero character overlap — which is what makes the
  string feature language-sensitive, as in the paper.
- **semantics**: each latent word has a unit Gaussian latent vector; a
  language's embedding for its surface token is ``normalize(latent + σ·ε)``
  with per-language noise σ (simulating MUSE alignment error) and an OOV
  rate (simulating missing fastText entries). See ``repro.text.embeddings``
  for the consuming side.

Everything is deterministic in ``spec.seed`` via named ``SeedSequence``
children, so Spark dataflows and the DuckDB oracle see identical data.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.kgdata.model import KG, KGPair

ALPHABETS = {
    "latin": "abcdefghijklmnopqrstuvwxyz",
    "hanzi": "".join(chr(0x4E00 + i) for i in range(26)),
    "kana": "".join(chr(0x30A2 + i) for i in range(26)),
}


@dataclass(frozen=True)
class LanguageProfile:
    """How a language renders latent words and how good its embeddings are.

    ``char_divergence`` is the per-character mutation probability relative to
    the script's reference rendering (0 = reference spelling). ``emb_noise``
    is the σ of the per-language perturbation of latent word vectors
    (cross-lingual embedding alignment error). ``oov_rate`` is the
    probability a word is missing from the embedding table.
    """

    name: str
    script: str = "latin"
    char_divergence: float = 0.0
    emb_noise: float = 0.15
    oov_rate: float = 0.1


@dataclass(frozen=True)
class StructureProfile:
    """Degree-distribution profile of the latent graph.

    ``kind`` is ``"dense"`` (uniform endpoint sampling — DBP15K/DBP100K-like)
    or ``"powerlaw"`` (Zipf-weighted endpoints — SRPRS's real-life
    distribution).
    """

    kind: str = "dense"
    avg_degree: float = 6.0
    alpha: float = 1.0


@dataclass(frozen=True)
class KGPairSpec:
    """Full recipe for one benchmark KG pair."""

    name: str
    n_pairs: int
    lang1: LanguageProfile
    lang2: LanguageProfile
    structure: StructureProfile = field(default_factory=StructureProfile)
    edge_keep: float = 0.75
    noise_edge_frac: float = 0.15
    extra_entity_frac: float = 0.0
    n_relations: int = 20
    vocab_ratio: float = 0.6
    d_text: int = 32
    seed_ratio: float = 0.3
    seed: int = 0


def _script_perm(script: str) -> np.ndarray:
    """Deterministic per-script permutation of alphabet indices, so scripts
    are not trivial transliterations of each other but every language using a
    script agrees on the reference spelling."""
    rng = np.random.default_rng(zlib.crc32(script.encode()))
    return rng.permutation(26)


def _render_word(indices: np.ndarray, lang: LanguageProfile, rng: np.random.Generator) -> str:
    alpha = ALPHABETS[lang.script]
    perm = _script_perm(lang.script)
    chars = [alpha[perm[i]] for i in indices]
    if lang.char_divergence > 0:
        out: list[str] = []
        for c in chars:
            if rng.random() < lang.char_divergence:
                op = rng.random()
                if op < 0.6:  # substitute
                    out.append(alpha[rng.integers(26)])
                elif op < 0.8:  # delete
                    continue
                else:  # insert before
                    out.append(alpha[rng.integers(26)])
                    out.append(c)
            else:
                out.append(c)
        chars = out or [alpha[rng.integers(26)]]
    return "".join(chars)


def _sample_names(
    rng: np.random.Generator, n: int, n_words: int, used: set[tuple[int, ...]]
) -> list[tuple[int, ...]]:
    """Sample ``n`` distinct entity names as tuples of latent word ids,
    Zipf-weighted so common words recur (realistic token statistics)."""
    ranks = np.arange(1, n_words + 1)
    p = 1.0 / ranks**0.8
    p /= p.sum()
    names: list[tuple[int, ...]] = []
    while len(names) < n:
        k = int(rng.integers(1, 4))
        cand = tuple(int(w) for w in rng.choice(n_words, size=k, p=p, replace=False))
        for _ in range(30):
            if cand not in used:
                break
            extra = int(rng.choice(n_words, p=p))
            cand = cand + (extra,)
        used.add(cand)
        names.append(cand)
    return names


def _latent_edges(rng: np.random.Generator, n: int, prof: StructureProfile, n_rel: int) -> pd.DataFrame:
    m = max(n, int(round(prof.avg_degree * n / 2)))
    if prof.kind == "powerlaw":
        w = 1.0 / np.arange(1, n + 1) ** prof.alpha
        w = w[rng.permutation(n)]
        p = w / w.sum()
    elif prof.kind == "dense":
        p = None
    else:
        raise ValueError(f"unknown structure kind: {prof.kind}")
    h = rng.choice(n, size=m, p=p)
    t = rng.choice(n, size=m, p=p)
    keep = h != t
    return pd.DataFrame(
        {"h": h[keep], "r": rng.integers(0, n_rel, size=int(keep.sum())), "t": t[keep]}
    )


def _kg_view(
    rng: np.random.Generator,
    latent: pd.DataFrame,
    spec: KGPairSpec,
    n_core: int,
    n_extra: int,
) -> pd.DataFrame:
    """One KG's triple set over *latent* indices 0..n_core+n_extra-1."""
    kept = latent[rng.random(len(latent)) < spec.edge_keep].copy()
    n_total = n_core + n_extra
    parts = [kept]
    n_noise = int(round(spec.noise_edge_frac * len(kept)))
    if n_noise:
        parts.append(
            pd.DataFrame(
                {
                    "h": rng.integers(0, n_total, n_noise),
                    "r": rng.integers(0, spec.n_relations, n_noise),
                    "t": rng.integers(0, n_total, n_noise),
                }
            )
        )
    if n_extra:
        deg = rng.integers(1, 4, n_extra)
        heads = np.repeat(np.arange(n_core, n_total), deg)
        parts.append(
            pd.DataFrame(
                {
                    "h": heads,
                    "r": rng.integers(0, spec.n_relations, len(heads)),
                    "t": rng.integers(0, n_core, len(heads)),
                }
            )
        )
    df = pd.concat(parts, ignore_index=True)
    return df[df["h"] != df["t"]].reset_index(drop=True)


def _surface_vocab(
    words: list[np.ndarray], used_word_ids: np.ndarray, lang: LanguageProfile, base_seed: int
) -> dict[int, str]:
    """Deterministic surface form per (language, latent word)."""
    out = {}
    lang_key = zlib.crc32(lang.name.encode())
    for w in used_word_ids:
        rng = np.random.default_rng(np.random.SeedSequence([base_seed, lang_key, int(w)]))
        out[int(w)] = _render_word(words[int(w)], lang, rng)
    return out


def _emb_table(
    z: np.ndarray,
    surface: dict[int, str],
    lang: LanguageProfile,
    base_seed: int,
) -> pd.DataFrame:
    """Word-embedding table for one language: token -> vector, with OOV holes
    and per-language alignment noise. Homonymous surface collisions keep the
    first entry (as a real embedding table would have one row per token)."""
    lang_key = zlib.crc32(("emb:" + lang.name).encode())
    rows: dict[str, list[float]] = {}
    for w, tok in surface.items():
        rng = np.random.default_rng(np.random.SeedSequence([base_seed, lang_key, int(w)]))
        if rng.random() < lang.oov_rate:
            continue
        v = z[w] + lang.emb_noise * rng.standard_normal(z.shape[1])
        v = v / (np.linalg.norm(v) + 1e-12)
        rows.setdefault(tok, v.tolist())
    return pd.DataFrame({"token": list(rows.keys()), "vector": list(rows.values())})


def generate_pair(spec: KGPairSpec) -> KGPair:
    """Generate one KG pair per ``spec``. Deterministic in ``spec.seed``."""
    ss = np.random.SeedSequence(spec.seed)
    r_vocab, r_names, r_edges, r_kg1, r_kg2, r_split, r_z = (
        np.random.default_rng(c) for c in ss.spawn(7)
    )

    n_core = spec.n_pairs
    n_words = max(40, int(spec.n_pairs * spec.vocab_ratio))
    words = [r_vocab.integers(0, 26, size=int(r_vocab.integers(3, 9))) for _ in range(n_words)]
    z = r_z.standard_normal((n_words, spec.d_text))
    z /= np.linalg.norm(z, axis=1, keepdims=True)

    used: set[tuple[int, ...]] = set()
    core_names = _sample_names(r_names, n_core, n_words, used)
    n_extra = int(round(spec.extra_entity_frac * n_core))
    extra_names_1 = _sample_names(r_names, n_extra, n_words, used)
    extra_names_2 = _sample_names(r_names, n_extra, n_words, used)

    latent = _latent_edges(r_edges, n_core, spec.structure, spec.n_relations)
    tri1_latent = _kg_view(r_kg1, latent, spec, n_core, n_extra)
    tri2_latent = _kg_view(r_kg2, latent, spec, n_core, n_extra)

    kgs = []
    for rng, lang, extra_names, tri_latent in (
        (r_kg1, spec.lang1, extra_names_1, tri1_latent),
        (r_kg2, spec.lang2, extra_names_2, tri2_latent),
    ):
        all_names = core_names + extra_names
        n_total = len(all_names)
        perm = rng.permutation(n_total)  # latent index -> local entity id
        used_words = np.unique(np.concatenate([np.array(nm) for nm in all_names]))
        surface = _surface_vocab(words, used_words, lang, spec.seed)
        name_strs = [" ".join(surface[w] for w in nm) for nm in all_names]
        names_df = pd.DataFrame(
            {"id": perm, "name": name_strs}
        ).sort_values("id").reset_index(drop=True)
        triples = pd.DataFrame(
            {
                "h": perm[tri_latent["h"].to_numpy()],
                "r": tri_latent["r"].to_numpy(),
                "t": perm[tri_latent["t"].to_numpy()],
            }
        )
        emb = _emb_table(z, surface, lang, spec.seed)
        kgs.append((KG(triples=triples, names=names_df, lang=lang.name), perm, emb))

    (kg1, perm1, emb1), (kg2, perm2, emb2) = kgs
    links = pd.DataFrame({"e1": perm1[:n_core], "e2": perm2[:n_core]})
    order = r_split.permutation(n_core)
    n_seed = int(round(spec.seed_ratio * n_core))
    train = links.iloc[order[:n_seed]].reset_index(drop=True)
    test = links.iloc[order[n_seed:]].reset_index(drop=True)
    return KGPair(
        name=spec.name,
        kg1=kg1,
        kg2=kg2,
        links=links,
        train=train,
        test=test,
        emb1=emb1,
        emb2=emb2,
        meta={"spec": spec},
    )
