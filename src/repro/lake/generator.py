"""Synthetic data-lake generator (Webtable-lite / Wikitable-lite).

Generates a corpus of columns with the structural properties the DeepJoin
experiments depend on:

* **Domains.** Entities are partitioned into topic domains, each with its
  own vocabulary of canonical string values. Columns drawn from the same
  domain overlap; columns from different domains essentially do not.
* **Graded joinability.** Each column samples entities from its domain
  with a Zipf weight whose exponent varies per column, producing a spread
  of pairwise containment values (needed for meaningful top-k ranking,
  P@k and NDCG@k).
* **Semantic variants.** A configurable fraction of cells are replaced by
  a *variant* of the canonical value (misspelling, case change, format
  decoration). Variants break equi-joins but stay close in character-
  n-gram embedding space, which is exactly the gap between Definition 2.1
  (equi) and Definition 2.3 (semantic) in the paper.
* **Metadata.** Table title and column name are derived from the domain
  topic (informative); the table context mixes two topic words into a
  longer noisy sentence (weakly informative) — the generator is arranged
  so the paper's ablation findings (title/colname help, context hurts)
  are reproducible rather than baked in as constants.
* **Cell order.** Cells are emitted roughly in popularity order with a
  small local jitter, so a positional-encoding model can exploit order —
  the precondition for the cell-shuffle augmentation ablation.

Everything is deterministic in ``LakeConfig.seed``.
"""
from __future__ import annotations

from dataclasses import dataclass, replace
from typing import List

import numpy as np
import pandas as pd

_CONSONANTS = list("bcdfghjklmnprstvwz")
_VOWELS = list("aeiou")


def _make_words(g: np.random.Generator, n: int, min_syll: int, max_syll: int) -> List[str]:
    """Pronounceable deterministic pseudo-words (CV syllables)."""
    counts = g.integers(min_syll, max_syll + 1, n)
    words = []
    for c in counts:
        syll = g.integers(0, len(_CONSONANTS), c * 2)
        w = "".join(
            _CONSONANTS[syll[2 * i]] + _VOWELS[syll[2 * i + 1] % len(_VOWELS)]
            for i in range(c)
        )
        words.append(w)
    return words


@dataclass(frozen=True)
class LakeConfig:
    """Knobs for a synthetic data lake; see module docstring."""

    name: str
    seed: int = 0
    n_domains: int = 60
    pool_size_min: int = 100
    pool_size_max: int = 600
    n_columns: int = 2_000
    n_queries: int = 50
    # lognormal column-size distribution, clipped to [5, col_size_max]
    col_size_log_mean: float = 2.6
    col_size_log_sigma: float = 0.75
    col_size_max: int = 1_200
    # fraction of cells replaced by a dirty variant of the canonical value
    variant_rate: float = 0.15
    # per-column Zipf exponent range for entity sampling
    alpha_min: float = 0.7
    alpha_max: float = 2.0
    # entity surface form: words per entity and syllables per word
    entity_words_max: int = 2
    word_syll_min: int = 2
    word_syll_max: int = 4
    # shared noise vocabulary (context sentences, title noise)
    noise_vocab: int = 400
    # fraction of adjacent cell pairs jittered out of popularity order
    order_jitter: float = 0.15
    # heavy tail: a few domains get big entity pools, and ~1% of columns
    # get a 5-30x size multiplier — reproduces Table 2's max |X| in the
    # thousands while keeping avg |X| ~ 20
    big_domains: int = 4
    big_pool_max: int = 4_000
    tail_prob: float = 0.01
    # cross-domain entity sharing: a fraction of each domain's pool is
    # drawn from a global shared pool (cities/names/etc. recur across
    # topics in real lakes). Gives queries moderately-joinable columns
    # in *other* domains, so larger-k precision requires content
    # ranking, not just topic identification.
    shared_pool: int = 1_500
    share_rate: float = 0.25


WEBTABLE_LITE = LakeConfig(
    name="webtable",
    seed=7,
    n_domains=60,
    pool_size_min=120,
    pool_size_max=700,
    variant_rate=0.15,
    col_size_log_mean=2.65,
    col_size_log_sigma=0.75,
    col_size_max=3_500,
    alpha_min=0.9,
)

# Wikitable-lite: more, smaller domains with noisier metadata — the paper's
# Wikitable corpus yields systematically lower equi-join precision, which
# this shape reproduces (more near-duplicate domains to confuse).
WIKITABLE_LITE = LakeConfig(
    name="wikitable",
    seed=11,
    n_domains=140,
    pool_size_min=60,
    pool_size_max=350,
    variant_rate=0.22,
    col_size_log_mean=2.55,
    col_size_log_sigma=0.70,
    col_size_max=1_500,
    alpha_min=0.9,
    word_syll_min=2,
    word_syll_max=5,
    big_pool_max=2_000,
)


def _variant(g: np.random.Generator, value: str) -> str:
    """A dirty surface variant: misspelling / case / light format change.

    Edits are character-local so the variant shares most character
    n-grams with the canonical value (close in fastText-lite space) but
    is a different exact string (breaks equi-join).
    """
    kind = int(g.integers(0, 5))
    if kind == 0:  # title-case / case change
        return value.title() if value == value.lower() else value.lower()
    words = value.split(" ")
    wi = int(g.integers(0, len(words)))
    w = words[wi]
    if len(w) < 3:
        kind = 4
    if kind == 1:  # swap two adjacent chars
        i = int(g.integers(0, len(w) - 1))
        w = w[:i] + w[i + 1] + w[i] + w[i + 2:]
    elif kind == 2:  # drop a char
        i = int(g.integers(1, len(w)))
        w = w[:i] + w[i + 1:]
    elif kind == 3:  # duplicate a char
        i = int(g.integers(0, len(w)))
        w = w[:i] + w[i] + w[i:]
    else:  # format decoration
        w = w + "s" if not w.endswith("s") else w[:-1]
    words[wi] = w
    return " ".join(words)


@dataclass
class Domain:
    """One topic domain: its entity pool and metadata vocabulary."""

    domain_id: int
    topic_words: List[str]
    entities: List[str]  # canonical surface forms
    ids: List[int]  # global canonical id per entity (shared entities
    # keep their shared-pool id, so canonical containment sees overlap)


@dataclass
class LakeData:
    """The generated lake: one row per column in ``columns``.

    ``columns`` schema (pandas):
      col_id:int, role:{corpus,query}, domain:int, table_title:str,
      col_name:str, context:str, cells:list[str], canon:list[int]
      (global canonical-entity id per cell — the hidden ground truth used
      for "expert" labels), n_cells:int.
    """

    config: LakeConfig
    domains: List[Domain]
    columns: pd.DataFrame


def _sample_column_cells(
    g: np.random.Generator, dom: Domain, size: int, alpha: float,
    variant_rate: float, order_jitter: float,
):
    pool = len(dom.entities)
    if size >= pool * 0.5:
        # huge columns are near-complete domain dumps (Zipf dedup could
        # never reach them); matches the heavy tail of real web tables
        ents = g.permutation(pool)[: min(size, pool)]
    else:
        ranks = np.arange(1, pool + 1, dtype=np.float64)
        w = ranks ** (-alpha)
        w /= w.sum()
        # over-sample with replacement, dedup preserving first occurrence
        draw = g.choice(pool, size=min(pool, size * 4), p=w, replace=True)
        _, first = np.unique(draw, return_index=True)
        ents = draw[np.sort(first)][:size]
    if len(ents) < 5:  # top up from the head of the pool
        extra = [i for i in range(pool) if i not in set(ents.tolist())]
        ents = np.concatenate([ents, np.array(extra[: 5 - len(ents)], dtype=ents.dtype)])
    # popularity (rank) order with a local jitter
    ents = np.sort(ents)
    for i in range(len(ents) - 1):
        if g.random() < order_jitter:
            ents[i], ents[i + 1] = ents[i + 1], ents[i]
    cells, canon, seen = [], [], set()
    for e in ents:
        v = dom.entities[int(e)]
        if g.random() < variant_rate:
            v = _variant(g, v)
        if v in seen:  # columns are sets (paper dedups cell values)
            continue
        seen.add(v)
        cells.append(v)
        canon.append(dom.ids[int(e)])
    return cells, canon


def generate_lake(cfg: LakeConfig, *, n_columns: int | None = None,
                  n_queries: int | None = None) -> LakeData:
    """Generate a deterministic synthetic lake per ``cfg``.

    ``n_columns`` / ``n_queries`` override the config (used by tests and
    by the scalability sweep, which slices one big lake instead of
    regenerating).
    """
    cfg = replace(
        cfg,
        n_columns=n_columns if n_columns is not None else cfg.n_columns,
        n_queries=n_queries if n_queries is not None else cfg.n_queries,
    )
    g = np.random.default_rng(cfg.seed)

    noise_words = _make_words(g, cfg.noise_vocab, 1, 3)
    # global shared pool (ids 0 .. shared_pool-1)
    shared_surfaces = _make_words(g, cfg.shared_pool, cfg.word_syll_min, cfg.word_syll_max)
    domains: List[Domain] = []
    base = cfg.shared_pool
    for d in range(cfg.n_domains):
        if d < cfg.big_domains:
            pool = int(g.integers(cfg.pool_size_max, cfg.big_pool_max + 1))
        else:
            pool = int(g.integers(cfg.pool_size_min, cfg.pool_size_max + 1))
        words = _make_words(g, pool + 3, cfg.word_syll_min, cfg.word_syll_max)
        topic = words[:3]
        ents, ids = [], []
        seen = set()
        for i in range(pool):
            if cfg.shared_pool and g.random() < cfg.share_rate:
                j = int(g.integers(0, cfg.shared_pool))
                e, gid = shared_surfaces[j], j
            else:
                nw = 1 + int(g.integers(0, cfg.entity_words_max))
                if nw == 1:
                    e = words[3 + i]
                else:
                    e = words[3 + i] + " " + words[3 + int(g.integers(0, pool))]
                gid = base + i
            if e in seen:  # keep surfaces unique within the domain
                continue
            seen.add(e)
            ents.append(e)
            ids.append(gid)
        domains.append(Domain(d, topic, ents, ids))
        base += pool

    n_total = cfg.n_columns + cfg.n_queries
    dom_ids = g.integers(0, cfg.n_domains, n_total)
    sizes = np.rint(
        g.lognormal(cfg.col_size_log_mean, cfg.col_size_log_sigma, n_total)
    ).astype(int)
    # heavy tail: ~1% of columns are huge *mixed dumps* sampled from the
    # global entity universe across all domains (real web-table long
    # columns are heterogeneous lists, not single-topic dumps). They get
    # domain = -1: high |X| but low joinability to any query — the
    # false-positive bait for size-partitioned sketch methods.
    tail = g.random(n_total) < cfg.tail_prob
    tail[n_total - cfg.n_queries :] = False  # queries stay single-domain
    sizes[tail] = sizes[tail] * g.integers(20, 101, int(tail.sum()))
    sizes = np.clip(sizes, 5, cfg.col_size_max)
    alphas = g.uniform(cfg.alpha_min, cfg.alpha_max, n_total)

    # flat global universe for mixed-dump tail columns
    all_entities = [(d.ids[i], e) for d in domains for i, e in enumerate(d.entities)]

    rows = []
    for i in range(n_total):
        dom = domains[int(dom_ids[i])]
        if tail[i]:
            take = g.choice(len(all_entities), size=min(int(sizes[i]), len(all_entities)),
                            replace=False)
            cells, canon, seen = [], [], set()
            for j in np.sort(take):
                gid, v = all_entities[int(j)]
                if g.random() < cfg.variant_rate:
                    v = _variant(g, v)
                if v in seen:
                    continue
                seen.add(v)
                cells.append(v)
                canon.append(gid)
            dom_label = -1
        else:
            cells, canon = _sample_column_cells(
                g, dom, int(sizes[i]), float(alphas[i]),
                cfg.variant_rate, cfg.order_jitter,
            )
            dom_label = int(dom_ids[i])
        topic = dom.topic_words
        title_noise = [noise_words[int(g.integers(0, len(noise_words)))]] if g.random() < 0.3 else []
        title = " ".join([topic[0], topic[1]] + title_noise)
        col_name = topic[2] if g.random() < 0.9 else noise_words[int(g.integers(0, len(noise_words)))]
        ctx_noise = [noise_words[int(j)] for j in g.integers(0, len(noise_words), 8)]
        context = " ".join([topic[0], topic[2]] + ctx_noise)
        rows.append(
            {
                "col_id": i,
                "role": "corpus" if i < cfg.n_columns else "query",
                "domain": dom_label,
                "table_title": title,
                "col_name": col_name,
                "context": context,
                "cells": cells,
                "canon": canon,
                "n_cells": len(cells),
            }
        )
    return LakeData(cfg, domains, pd.DataFrame(rows))
