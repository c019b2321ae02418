"""Per-table experiment drivers (DESIGN.md § 4 maps tables → here).

Every driver takes an ``ExperimentContext`` and returns a pandas
DataFrame shaped like the paper's table. Accuracy experiments rank with
exact kNN over the embeddings (HNSW recall ≥95% is validated by
``hnsw_recall_check``; using exact kNN removes ANN noise from accuracy
comparisons). Timing experiments (Tables 13–15) run the real pipeline:
query encoding + HNSW search.
"""
from __future__ import annotations

import time
from typing import Callable, Dict, List, Sequence, Tuple

import numpy as np
import pandas as pd

from repro.ann.hnsw import HNSWIndex
from repro.embed.plm import DISTILBERT_LITE, MPNET_LITE
from repro.eval.context import ExperimentContext
from repro.eval.methods import (
    DeepJoinMethod,
    FastTextMethod,
    FrozenPLMMethod,
    MLPMethod,
    TaBERTMethod,
    collect_embeddings,
    render_rows,
    topk_ids,
)
from repro.eval.metrics import mean_over_queries, ndcg_at_k, pooled_prf, precision_at_k
from repro.josie.index import build_inverted_index
from repro.josie.search import josie_topk
from repro.lake.corpus import corpus_stats
from repro.lshensemble.ensemble import LSHEnsemble
from repro.pexeso.search import PexesoIndex
from repro.text.transform import DEFAULT_OPTION, OPTIONS

K_GRID = (10, 20, 30, 40, 50)
SHUFFLE_RATES = (0.0, 0.1, 0.2, 0.3, 0.4, 0.5)


# ---------------------------------------------------------------- helpers
def embedding_results(
    ctx: ExperimentContext, method, kmax: int, *, needs_text: bool = False,
    option: str = DEFAULT_OPTION, repo_df=None, queries_pdf=None,
) -> Dict[int, List[int]]:
    """Ranked ids per query for an embedding method (exact kNN)."""
    repo = repo_df if repo_df is not None else (
        ctx.contextualized(option) if needs_text else ctx.repo_df
    )
    qpdf = queries_pdf if queries_pdf is not None else ctx.queries_pdf
    ids, mat = collect_embeddings(method.embed_corpus_df(repo))
    qmat = method.embed_queries(qpdf)
    ranked = topk_ids(ids, mat, qmat, kmax)
    return {int(q): r for q, r in zip(qpdf.col_id, ranked)}


def lsh_results(ctx: ExperimentContext, kmax: int, *, repo_df=None,
                queries_pdf=None, ens: LSHEnsemble | None = None) -> Dict[int, List[int]]:
    ens = ens or LSHEnsemble().fit(repo_df if repo_df is not None else ctx.repo_df)
    qpdf = queries_pdf if queries_pdf is not None else ctx.queries_pdf
    return {
        int(r.col_id): [x for x, _ in ens.query(list(r.cells), kmax)]
        for r in qpdf.itertuples()
    }


def accuracy_table(
    truth: Dict[int, Tuple[List[int], Dict[int, float]]],
    results: Dict[str, Dict[int, List[int]]],
    ks: Sequence[int] = K_GRID,
) -> pd.DataFrame:
    """Rows: method; columns: P@k and NDCG@k for each k."""
    rows = []
    for name, res in results.items():
        row = {"method": name}
        for k in ks:
            ps, ns = [], []
            for q, (exact_rank, jn_map) in truth.items():
                got = res.get(q, [])
                ps.append(precision_at_k(got, exact_rank, k))
                ns.append(ndcg_at_k(got, exact_rank, jn_map, k))
            row[f"P@{k}"] = round(mean_over_queries(ps), 3)
            row[f"NDCG@{k}"] = round(mean_over_queries(ns), 3)
        rows.append(row)
    return pd.DataFrame(rows)


def _dj_method(ctx: ExperimentContext, plm: str, join_type: str, tau: float,
               option: str = DEFAULT_OPTION, shuffle_rate: float = 0.2) -> DeepJoinMethod:
    name = {"mpnet-lite": "DeepJoin_MPNet", "distilbert-lite": "DeepJoin_DistilBERT"}[plm]
    model = ctx.deepjoin(plm, join_type, tau, option, shuffle_rate)
    return DeepJoinMethod(model, name, option)


# ---------------------------------------------------------------- Table 2
def table2_stats(ctx: ExperimentContext) -> pd.DataFrame:
    """Dataset statistics + positive-example counts (train slice)."""
    rows = []
    for label, df in ((f"{ctx.dataset}-train", ctx.train_df),
                      (f"{ctx.dataset}-test", ctx.repo_df)):
        s = corpus_stats(df)
        row = {"dataset": label, "|X|": s["n_columns"], "max|X|": s["max_cells"],
               "min|X|": s["min_cells"], "avg|X|": s["avg_cells"]}
        if label.endswith("train"):
            row["pos_equi"] = len(ctx.positives("equi"))
            row["pos_semantic"] = len(ctx.positives("semantic", 0.9))
        rows.append(row)
    return pd.DataFrame(rows)


# ---------------------------------------------------------------- Table 3
def table3_equi_accuracy(ctx: ExperimentContext, ks=K_GRID) -> pd.DataFrame:
    kmax = max(ks)
    truth = ctx.truth_maps(ctx.equi_scores())
    results: Dict[str, Dict[int, List[int]]] = {}
    results["LSH Ensemble"] = lsh_results(ctx, kmax)
    results["fastText"] = embedding_results(ctx, FastTextMethod(ctx.ft), kmax)
    results["BERT"] = embedding_results(
        ctx, FrozenPLMMethod(DISTILBERT_LITE, "BERT", DEFAULT_OPTION), kmax, needs_text=True)
    results["MPNet"] = embedding_results(
        ctx, FrozenPLMMethod(MPNET_LITE, "MPNet", DEFAULT_OPTION), kmax, needs_text=True)
    results["TaBERT"] = embedding_results(ctx, TaBERTMethod(), kmax)
    results["MLP"] = embedding_results(ctx, MLPMethod(ctx.mlp("equi")), kmax)
    for plm in ("distilbert-lite", "mpnet-lite"):
        m = _dj_method(ctx, plm, "equi", 0.9)
        results[m.name] = embedding_results(ctx, m, kmax, needs_text=True)
    return accuracy_table(truth, results, ks)


# ------------------------------------------------------------ Tables 4-6
def table4_6_semantic_accuracy(ctx: ExperimentContext, tau: float,
                               ks=K_GRID) -> pd.DataFrame:
    kmax = max(ks)
    truth = ctx.truth_maps(ctx.semantic_scores(tau))
    results: Dict[str, Dict[int, List[int]]] = {}
    results["LSH Ensemble"] = lsh_results(ctx, kmax)
    results["fastText"] = embedding_results(ctx, FastTextMethod(ctx.ft), kmax)
    for plm in ("distilbert-lite", "mpnet-lite"):
        m = _dj_method(ctx, plm, "semantic", tau)
        results[m.name] = embedding_results(ctx, m, kmax, needs_text=True)
    return accuracy_table(truth, results, ks)


# ---------------------------------------------------------------- Table 7
def table7_expert(ctx: ExperimentContext, k: int = 20,
                  tau: float = 0.9) -> pd.DataFrame:
    """Pooled precision/recall/F1 against generator ground truth."""
    results: Dict[str, Dict[int, List[int]]] = {}
    results["LSH Ensemble"] = lsh_results(ctx, k)
    results["fastText"] = embedding_results(ctx, FastTextMethod(ctx.ft), k)
    pex = PexesoIndex(ft=ctx.ft).fit(ctx.spark, ctx.repo_df)
    pex_pdf = pex.query_all(ctx.queries_df, tau, k).toPandas()
    results["PEXESO"] = {
        int(q): list(grp.sort_values("rank").x_id)
        for q, grp in pex_pdf.groupby("q_id")
    }
    m = _dj_method(ctx, "mpnet-lite", "semantic", tau)
    results[m.name] = embedding_results(ctx, m, k, needs_text=True)

    rows = []
    for name, res in results.items():
        ps, rs, f1s = [], [], []
        for q_row in ctx.queries_pdf.itertuples():
            q = int(q_row.col_id)
            joinable = ctx.expert_joinable(q_row)
            # retrieved pool: union of all methods' top-k for this query
            pool = set().union(*(set(r.get(q, [])) for r in results.values()))
            pool_joinable = joinable & pool
            retrieved = set(res.get(q, []))
            p, r, f1 = pooled_prf(retrieved, pool_joinable)
            ps.append(p); rs.append(r); f1s.append(f1)
        rows.append({"method": name, "Precision": round(np.mean(ps), 3),
                     "Recall": round(np.mean(rs), 3), "F1": round(np.mean(f1s), 3)})
    return pd.DataFrame(rows)


# ---------------------------------------------------------------- Table 8
SIZE_GROUPS = ((5, 10), (11, 50), (51, 10**9))


def _size_group_frames(ctx: ExperimentContext, lo: int, hi: int, cap: int | None = None):
    repo_pdf = ctx.repo_pdf[(ctx.repo_pdf.n_cells >= lo) & (ctx.repo_pdf.n_cells <= hi)]
    if cap:
        repo_pdf = repo_pdf.iloc[:cap]
    q_pdf = ctx.queries_pdf[
        (ctx.queries_pdf.n_cells >= lo) & (ctx.queries_pdf.n_cells <= hi)
    ]
    repo_df = ctx.all_df.filter(ctx.all_df.col_id.isin(set(repo_pdf.col_id))).cache()
    q_df = ctx.all_df.filter(ctx.all_df.col_id.isin(set(q_pdf.col_id))).cache()
    return repo_pdf, repo_df, q_pdf, q_df


def table8_accuracy_by_size(ctx: ExperimentContext, k: int = 10) -> pd.DataFrame:
    """P@k / NDCG@k per column-size group, equi and semantic, k=10."""
    from repro.joinability.exact import equi_joinability, semantic_joinability
    from repro.text.transform import contextualize

    rows = []
    for join_type in ("equi", "semantic"):
        for lo, hi in SIZE_GROUPS:
            repo_pdf, repo_df, q_pdf, q_df = _size_group_frames(ctx, lo, hi)
            if len(q_pdf) == 0 or len(repo_pdf) < k:
                continue
            if join_type == "equi":
                scores = equi_joinability(q_df, repo_df).toPandas()
            else:
                scores = semantic_joinability(ctx.spark, q_df, repo_df, ctx.ft, 0.9).toPandas()
            truth = ctx.truth_maps(scores)
            ctx_text = contextualize(repo_df, DEFAULT_OPTION, freq=ctx.freq)
            methods: Dict[str, Dict[int, List[int]]] = {}
            methods["LSH Ensemble"] = lsh_results(ctx, k, repo_df=repo_df, queries_pdf=q_pdf)
            methods["fastText"] = embedding_results(
                ctx, FastTextMethod(ctx.ft), k, repo_df=repo_df, queries_pdf=q_pdf)
            if join_type == "equi":
                methods["BERT"] = embedding_results(
                    ctx, FrozenPLMMethod(DISTILBERT_LITE, "BERT", DEFAULT_OPTION), k,
                    repo_df=ctx_text, queries_pdf=q_pdf)
                methods["MPNet"] = embedding_results(
                    ctx, FrozenPLMMethod(MPNET_LITE, "MPNet", DEFAULT_OPTION), k,
                    repo_df=ctx_text, queries_pdf=q_pdf)
                methods["TaBERT"] = embedding_results(
                    ctx, TaBERTMethod(), k, repo_df=repo_df, queries_pdf=q_pdf)
                methods["MLP"] = embedding_results(
                    ctx, MLPMethod(ctx.mlp("equi")), k, repo_df=repo_df, queries_pdf=q_pdf)
            for plm in ("distilbert-lite", "mpnet-lite"):
                m = _dj_method(ctx, plm, join_type, 0.9)
                methods[m.name] = embedding_results(
                    ctx, m, k, repo_df=ctx_text, queries_pdf=q_pdf)
            acc = accuracy_table(truth, methods, ks=(k,))
            for _, r in acc.iterrows():
                rows.append({
                    "join": join_type, "group": f"{lo}-{hi if hi < 10**9 else 'inf'}",
                    "method": r["method"], f"P@{k}": r[f"P@{k}"],
                    f"NDCG@{k}": r[f"NDCG@{k}"],
                })
    return pd.DataFrame(rows)


# ------------------------------------------------------------ Tables 9/10
def table9_10_transform_ablation(ctx: ExperimentContext, join_type: str,
                                 tau: float = 0.9, ks=K_GRID) -> pd.DataFrame:
    kmax = max(ks)
    scores = ctx.equi_scores() if join_type == "equi" else ctx.semantic_scores(tau)
    truth = ctx.truth_maps(scores)
    results = {}
    for option in OPTIONS:
        m = _dj_method(ctx, "mpnet-lite", join_type, tau, option=option)
        results[option] = embedding_results(ctx, m, kmax, needs_text=True, option=option)
    return accuracy_table(truth, results, ks)


# ----------------------------------------------------------- Tables 11/12
def table11_12_shuffle_ablation(ctx: ExperimentContext, join_type: str,
                                tau: float = 0.9, ks=K_GRID) -> pd.DataFrame:
    kmax = max(ks)
    scores = ctx.equi_scores() if join_type == "equi" else ctx.semantic_scores(tau)
    truth = ctx.truth_maps(scores)
    results = {}
    for rate in SHUFFLE_RATES:
        m = _dj_method(ctx, "mpnet-lite", join_type, tau, shuffle_rate=rate)
        label = "no-shuffle" if rate == 0.0 else f"{rate:.1f}"
        results[label] = embedding_results(ctx, m, kmax, needs_text=True)
    return accuracy_table(truth, results, ks)


# ------------------------------------------------------------ Tables 13-15
def _time_embedding_pipeline(
    ctx: ExperimentContext, method, repo_df, q_pdf, k: int,
    hnsw: HNSWIndex, ids: np.ndarray, mode: str = "cpu",
) -> Tuple[float, float]:
    """(encode_ms, total_ms) per query for the online path."""
    n = len(q_pdf)
    t0 = time.perf_counter()
    if mode == "gpu":  # batched/vectorized pass (accelerator analogue)
        qmat = method.embed_queries(q_pdf)
    else:  # per-query loop (CPU analogue)
        mats = [method.embed_queries(q_pdf.iloc[i : i + 1]) for i in range(n)]
        qmat = np.vstack(mats)
    t_enc = time.perf_counter() - t0
    t0 = time.perf_counter()
    for q in qmat:
        hnsw.search(q, k)
    t_ann = time.perf_counter() - t0
    return 1000 * t_enc / n, 1000 * (t_enc + t_ann) / n


def timing_suite(
    ctx: ExperimentContext, join_type: str, repo_pdf: pd.DataFrame,
    repo_df, q_pdf, q_df, k: int,
    dj_model, dj_option: str = DEFAULT_OPTION,
    hnsw_cache: Dict[str, Tuple[HNSWIndex, np.ndarray]] | None = None,
    baseline_cache: Dict[str, object] | None = None,
) -> Dict[str, Dict[str, float]]:
    """Per-query times (ms) for every method on one repository slice.

    ``hnsw_cache`` carries incrementally-built HNSW indexes across
    repository sizes (keyed by method); ``baseline_cache`` reuses fitted
    LSH/JOSIE/PEXESO indexes when the repository is unchanged (e.g. the
    k sweep of Table 14 — index build is offline, only queries are
    timed).
    """
    from repro.text.transform import contextualize

    out: Dict[str, Dict[str, float]] = {}
    nq = len(q_pdf)
    bc = baseline_cache if baseline_cache is not None else {}

    # --- LSH Ensemble (equi) / exact baselines -----------------------
    if join_type == "equi":
        ens = bc.get("lsh") or LSHEnsemble().fit(repo_df)
        bc["lsh"] = ens
        t0 = time.perf_counter()
        for r in q_pdf.itertuples():
            ens.query(list(r.cells), k)
        out["LSH Ensemble"] = {"total_ms": 1000 * (time.perf_counter() - t0) / nq}

        idx = bc.get("josie")
        if idx is None:
            idx = build_inverted_index(repo_df).cache()
            idx.postings.count()
            bc["josie"] = idx
        t0 = time.perf_counter()
        josie_topk(idx, q_df, k).collect()
        out["JOSIE"] = {"total_ms": 1000 * (time.perf_counter() - t0) / nq}
    else:
        pex = bc.get("pexeso")
        if pex is None:
            pex = PexesoIndex(ft=ctx.ft).fit(ctx.spark, repo_df)
            bc["pexeso"] = pex
        t0 = time.perf_counter()
        pex.query_all(q_df, 0.9, k).collect()
        out["PEXESO"] = {"total_ms": 1000 * (time.perf_counter() - t0) / nq}

    # --- embedding methods -------------------------------------------
    cache = hnsw_cache if hnsw_cache is not None else {}

    def _index_for(key: str, method, needs_text: bool):
        if bc.get("static_corpus") and key in cache:
            return cache[key][0], cache[key][1]
        repo = contextualize(repo_df, dj_option, freq=ctx.freq) if needs_text else repo_df
        ids, mat = collect_embeddings(method.embed_corpus_df(repo))
        if key in cache:
            index, done_ids = cache[key]
            new = ~np.isin(ids, done_ids)
            if new.any():
                index.add_batch(mat[new])
                cache[key] = (index, np.concatenate([done_ids, ids[new]]))
                ids = np.concatenate([done_ids, ids[new]])
            else:
                ids = done_ids
        else:
            index = HNSWIndex(dim=mat.shape[1], ef_construction=60, seed=0)
            index.add_batch(mat)
            cache[key] = (index, ids)
        return cache[key][0], cache[key][1]

    if join_type == "equi":
        ftm = FastTextMethod(ctx.ft)
        index, ids = _index_for("fastText", ftm, needs_text=False)
        enc, tot = _time_embedding_pipeline(ctx, ftm, repo_df, q_pdf, k, index, ids, "cpu")
        out["fastText"] = {"encode_ms": enc, "total_ms": tot}

    djm = DeepJoinMethod(dj_model, "DeepJoin", dj_option)
    index, ids = _index_for("DeepJoin", djm, needs_text=True)
    enc, tot = _time_embedding_pipeline(ctx, djm, repo_df, q_pdf, k, index, ids, "cpu")
    out["DeepJoin (CPU)"] = {"encode_ms": enc, "total_ms": tot}
    enc, tot = _time_embedding_pipeline(ctx, djm, repo_df, q_pdf, k, index, ids, "gpu")
    out["DeepJoin (GPU)"] = {"encode_ms": enc, "total_ms": tot}
    return out


def table13_time_vs_size(ctx: ExperimentContext, join_type: str,
                         sizes: Sequence[int], k: int = 10) -> pd.DataFrame:
    dj_model = ctx.deepjoin("mpnet-lite", join_type, 0.9)
    cache: Dict[str, Tuple[HNSWIndex, np.ndarray]] = {}
    rows = []
    q_pdf = ctx.queries_pdf.head(12)
    q_df = ctx.all_df.filter(ctx.all_df.col_id.isin(set(q_pdf.col_id))).cache()
    for s in sizes:
        repo_pdf = ctx.repo_pdf.iloc[:s]
        repo_df = ctx.all_df.filter(ctx.all_df.col_id.isin(set(repo_pdf.col_id))).cache()
        repo_df.count()
        res = timing_suite(ctx, join_type, repo_pdf, repo_df, q_pdf,
                           q_df, k, dj_model, hnsw_cache=cache)
        for name, t in res.items():
            rows.append({"method": name, "|X|": s,
                         "encode_ms": round(t.get("encode_ms", float("nan")), 2),
                         "total_ms": round(t["total_ms"], 2)})
        repo_df.unpersist()
    return pd.DataFrame(rows)


def table14_time_vs_k(ctx: ExperimentContext, join_type: str,
                      ks=K_GRID) -> pd.DataFrame:
    dj_model = ctx.deepjoin("mpnet-lite", join_type, 0.9)
    cache: Dict[str, Tuple[HNSWIndex, np.ndarray]] = {}
    bc: Dict[str, object] = {"static_corpus": True}
    q_pdf = ctx.queries_pdf.head(12)
    q_df = ctx.all_df.filter(ctx.all_df.col_id.isin(set(q_pdf.col_id))).cache()
    rows = []
    for k in ks:
        res = timing_suite(ctx, join_type, ctx.repo_pdf, ctx.repo_df,
                           q_pdf, q_df, k, dj_model,
                           hnsw_cache=cache, baseline_cache=bc)
        for name, t in res.items():
            rows.append({"method": name, "k": k,
                         "encode_ms": round(t.get("encode_ms", float("nan")), 2),
                         "total_ms": round(t["total_ms"], 2)})
    return pd.DataFrame(rows)


def table15_time_vs_colsize(ctx: ExperimentContext, join_type: str,
                            k: int = 10, cap: int = 3000) -> pd.DataFrame:
    dj_model = ctx.deepjoin("mpnet-lite", join_type, 0.9)
    rows = []
    for lo, hi in SIZE_GROUPS:
        repo_pdf, repo_df, q_pdf, q_df = _size_group_frames(ctx, lo, hi, cap=cap)
        if len(q_pdf) == 0 or len(repo_pdf) == 0:
            continue
        res = timing_suite(ctx, join_type, repo_pdf, repo_df, q_pdf, q_df, k,
                           dj_model, hnsw_cache=None)
        label = f"{lo}-{hi if hi < 10**9 else 'inf'}"
        for name, t in res.items():
            rows.append({"method": name, "group": label,
                         "encode_ms": round(t.get("encode_ms", float("nan")), 2),
                         "total_ms": round(t["total_ms"], 2)})
        repo_df.unpersist(); q_df.unpersist()
    return pd.DataFrame(rows)


# --------------------------------------------------- HNSW recall appendix
def hnsw_recall_check(ctx: ExperimentContext, k: int = 10, ef: int = 256) -> float:
    """Recall of HNSW (wide beam) vs exact kNN on DeepJoin embeddings —
    justifies using exact kNN in the accuracy tables. Timing tables use
    a narrower beam (ef=64..96) for speed; this check runs the beam an
    accuracy-focused deployment would."""
    m = _dj_method(ctx, "mpnet-lite", "equi", 0.9)
    ids, mat = collect_embeddings(m.embed_corpus_df(ctx.contextualized(DEFAULT_OPTION)))
    qmat = m.embed_queries(ctx.queries_pdf)
    exact = topk_ids(ids, mat, qmat, k)
    approx = topk_ids(ids, mat, qmat, k, use_hnsw=True, ef=ef)
    return float(np.mean([
        len(set(a) & set(e)) / len(e) for a, e in zip(approx, exact)
    ]))
