"""Benchmark assembly: lite-scale stand-ins for IDS15K / IDS100K / DBP1M.

``make_benchmark`` builds a :class:`KGPair` — two Spark-backed KGs with
ground-truth alignment, names, and a train/test seed split — for one of
the paper's six dataset configurations (plus tiny ``unit`` configs for
tests). All randomness is keyed off a single seed; the same call always
produces bit-identical data.
"""
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.kgdata.graphgen import GraphConfig, core_edges, side_triples
from repro.kgdata.names import NameNoise, generate_pair_names, generate_unknown_names
from repro.kgdata.vocab import Vocab, build_vocab


@dataclass(frozen=True)
class _Config:
    n_pairs: int
    n_unknown: tuple  # (source side, target side)
    n_triples: tuple
    n_relations: tuple
    p_keep_core: tuple
    vocab_size: int
    p_light: float  # fraction of string-similar translations in the vocab
    noise: NameNoise
    default_k: int  # paper's mini-batch count for this dataset


# Paper scales divided by ~10–150 (see DESIGN.md). EN-DE configs are
# sparser on the non-English side and have fewer relations, matching the
# shape of the paper's Table 1. dbp1m configs have asymmetric entity
# counts and unknown entities.
_CONFIGS = {
    ("ids15k", "en-fr"): _Config(1500, (0, 0), (4700, 4100), (60, 45), (0.92, 0.72), 1200, 0.58, NameNoise(), 5),
    ("ids15k", "en-de"): _Config(1500, (0, 0), (4800, 5000), (50, 30), (0.92, 0.78), 1200, 0.66, NameNoise(), 5),
    ("ids100k", "en-fr"): _Config(6000, (0, 0), (18600, 15500), (90, 65), (0.92, 0.72), 4200, 0.58, NameNoise(), 10),
    ("ids100k", "en-de"): _Config(6000, (0, 0), (20100, 20200), (85, 45), (0.92, 0.78), 4200, 0.66, NameNoise(), 10),
    ("dbp1m", "en-fr"): _Config(6500, (5500, 2300), (50000, 26000), (130, 85), (0.85, 0.60), 5000, 0.58, NameNoise(p_alias=0.06), 20),
    ("dbp1m", "en-de"): _Config(6000, (4400, 1100), (44000, 19000), (130, 55), (0.85, 0.65), 4800, 0.66, NameNoise(p_alias=0.06), 20),
    # Tiny configs for unit tests.
    ("unit", "en-fr"): _Config(300, (0, 0), (950, 820), (12, 9), (0.90, 0.75), 260, 0.58, NameNoise(), 3),
    ("unitk", "en-fr"): _Config(300, (120, 60), (1400, 900), (14, 9), (0.85, 0.70), 300, 0.58, NameNoise(), 3),
}

DATASETS = sorted({d for d, _ in _CONFIGS})
PAPER_DATASETS = [d for d in ("ids15k", "ids100k", "dbp1m")]
LANG_PAIRS = ["en-fr", "en-de"]


@dataclass
class KGPair:
    """A cross-lingual KG pair with ground truth and seed split.

    All DataFrames are Spark. ``triples_*`` have columns (h, r, t);
    ``names_*`` have (eid, name); ``alignment``/``train``/``test`` have
    (src, tgt). ``lexicons`` maps language code -> {surface form:
    concept id} — the "pretrained weights" consumed by hashbert.
    """

    name: str
    langs: tuple
    triples_s: DataFrame
    triples_t: DataFrame
    names_s: DataFrame
    names_t: DataFrame
    alignment: DataFrame
    train: DataFrame
    test: DataFrame
    lexicons: dict = field(repr=False)
    meta: dict = field(default_factory=dict)

    @property
    def default_k(self) -> int:
        return self.meta["default_k"]

    def swapped(self) -> "KGPair":
        """The same pair with source and target roles exchanged."""
        return KGPair(
            name=self.name,
            langs=(self.langs[1], self.langs[0]),
            triples_s=self.triples_t,
            triples_t=self.triples_s,
            names_s=self.names_t,
            names_t=self.names_s,
            alignment=self.alignment.select(
                F.col("tgt").alias("src"), F.col("src").alias("tgt")
            ),
            train=self.train.select(F.col("tgt").alias("src"), F.col("src").alias("tgt")),
            test=self.test.select(F.col("tgt").alias("src"), F.col("src").alias("tgt")),
            lexicons=self.lexicons,
            meta={**self.meta, "swapped": not self.meta.get("swapped", False)},
        )


def _scaled(cfg: _Config, scale: float) -> _Config:
    if scale == 1.0:
        return cfg
    s = lambda x: max(8, int(x * scale))  # noqa: E731
    return _Config(
        n_pairs=s(cfg.n_pairs),
        n_unknown=tuple(int(x * scale) for x in cfg.n_unknown),
        n_triples=tuple(s(x) for x in cfg.n_triples),
        n_relations=tuple(max(3, int(x * scale**0.5)) for x in cfg.n_relations),
        p_keep_core=cfg.p_keep_core,
        vocab_size=s(cfg.vocab_size),
        p_light=cfg.p_light,
        noise=cfg.noise,
        default_k=cfg.default_k,
    )


def make_benchmark(
    spark: SparkSession,
    dataset: str = "ids15k",
    langs: str = "en-fr",
    *,
    scale: float = 1.0,
    train_ratio: float = 0.2,
    seed: int = 7,
) -> KGPair:
    """Build one lite benchmark dataset as a :class:`KGPair`.

    Args:
        dataset: one of ``ids15k``, ``ids100k``, ``dbp1m``, ``unit``,
            ``unitk``.
        langs: ``en-fr`` or ``en-de`` (``unit*`` only support en-fr).
        scale: extra multiplier on the lite sizes (tests use < 1).
        train_ratio: fraction of the alignment used as seed alignment
            (paper default 20 %); 0 gives an empty train set for the
            unsupervised case study.
        seed: master seed; every sub-generator derives from it.
    """
    key = (dataset, langs)
    if key not in _CONFIGS:
        raise KeyError(f"unknown benchmark {key!r}; have {sorted(_CONFIGS)}")
    cfg = _scaled(_CONFIGS[key], scale)
    lang_pair = tuple(langs.split("-"))
    rng = np.random.default_rng(seed)

    vocab: Vocab = build_vocab(
        cfg.vocab_size, lang_pair, p_light=cfg.p_light, seed=seed * 13 + 1
    )
    src_names, tgt_names = generate_pair_names(
        vocab, cfg.n_pairs, noise=cfg.noise, seed=seed * 13 + 2
    )
    unk_s = generate_unknown_names(vocab, lang_pair[0], cfg.n_unknown[0], seed=seed * 13 + 3)
    unk_t = generate_unknown_names(vocab, lang_pair[1], cfg.n_unknown[1], seed=seed * 13 + 4)

    core = core_edges(
        cfg.n_pairs,
        n_core=int(3.0 * cfg.n_pairs),
        n_rel_concepts=max(cfg.n_relations),
        seed=seed * 13 + 5,
    )
    tri_raw_s = side_triples(
        core,
        GraphConfig(cfg.n_triples[0], cfg.n_relations[0], cfg.p_keep_core[0]),
        cfg.n_pairs,
        cfg.n_unknown[0],
        seed=seed * 13 + 6,
    )
    tri_raw_t = side_triples(
        core,
        GraphConfig(cfg.n_triples[1], cfg.n_relations[1], cfg.p_keep_core[1]),
        cfg.n_pairs,
        cfg.n_unknown[1],
        seed=seed * 13 + 7,
    )

    # Shuffle final ids on both sides so no algorithm can shortcut via
    # id correlation (raw pair index i is the same on both sides).
    n_s = cfg.n_pairs + cfg.n_unknown[0]
    n_t = cfg.n_pairs + cfg.n_unknown[1]
    perm_s = rng.permutation(n_s)
    perm_t = rng.permutation(n_t)

    def _remap(tri: pd.DataFrame, perm: np.ndarray) -> pd.DataFrame:
        return pd.DataFrame(
            {"h": perm[tri.h.to_numpy()], "r": tri.r, "t": perm[tri.t.to_numpy()]}
        )

    names_s_pdf = pd.DataFrame(
        {"eid": perm_s[np.arange(n_s)], "name": src_names + unk_s}
    )
    names_t_pdf = pd.DataFrame(
        {"eid": perm_t[np.arange(n_t)], "name": tgt_names + unk_t}
    )
    align_pdf = pd.DataFrame(
        {
            "src": perm_s[np.arange(cfg.n_pairs)],
            "tgt": perm_t[np.arange(cfg.n_pairs)],
        }
    )
    split = rng.permutation(cfg.n_pairs)
    n_train = int(round(train_ratio * cfg.n_pairs))
    train_pdf = align_pdf.iloc[np.sort(split[:n_train])].reset_index(drop=True)
    test_pdf = align_pdf.iloc[np.sort(split[n_train:])].reset_index(drop=True)

    mk = spark.createDataFrame
    empty = lambda: spark.createDataFrame([], "src long, tgt long")  # noqa: E731
    return KGPair(
        name=dataset,
        langs=lang_pair,
        triples_s=mk(_remap(tri_raw_s, perm_s)),
        triples_t=mk(_remap(tri_raw_t, perm_t)),
        names_s=mk(names_s_pdf),
        names_t=mk(names_t_pdf),
        alignment=mk(align_pdf),
        train=mk(train_pdf) if n_train else empty(),
        test=mk(test_pdf) if len(test_pdf) else empty(),
        lexicons=vocab.lexicons,
        meta={
            "dataset": dataset,
            "langs": langs,
            "default_k": cfg.default_k,
            "n_entities": (n_s, n_t),
            "n_pairs": cfg.n_pairs,
            "scale": scale,
            "train_ratio": train_ratio,
            "seed": seed,
        },
    )


def dataset_stats(kg: KGPair) -> dict:
    """Table-1 statistics computed with Spark aggregations.

    Returns a dict with per-side entity, relation, and triple counts.
    Entity counts come from the name tables (every generated entity has
    a name and, by construction, at least one triple).
    """
    def _side(triples: DataFrame, names: DataFrame) -> dict:
        row = triples.agg(
            F.count(F.lit(1)).alias("n_triples"),
            F.countDistinct("r").alias("n_relations"),
        ).collect()[0]
        return {
            "entities": names.count(),
            "relations": row["n_relations"],
            "triples": row["n_triples"],
        }

    return {
        "dataset": kg.name,
        "langs": "-".join(kg.langs),
        "source": _side(kg.triples_s, kg.names_s),
        "target": _side(kg.triples_t, kg.names_t),
        "alignment": kg.alignment.count(),
    }
