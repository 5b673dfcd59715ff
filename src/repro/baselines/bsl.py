"""BSL: the paper's heavily fine-tuned value-only baseline (Section 6).

BSL receives the *unpruned* disjunctive blocking graph (every pair
co-occurring in a purged token block or a name block), scores each pair
with a configurable string-similarity pipeline, and resolves with
Unique Mapping Clustering. The grid mirrors the paper's 420 configs:

* token n-grams, n in {1, 2, 3};
* TF or TF-IDF weights;
* Cosine, Jaccard, Generalized Jaccard similarities, plus the SiGMa
  weighted-overlap measure (TF-IDF only, as in the paper);
* UMC thresholds in [0, 1) with step 0.05.

The best F1 over the grid is reported, i.e. BSL is fine-tuned on the
ground truth exactly as the paper describes. Scoring runs in Spark; the
threshold sweep and UMC run on the driver over the collected scores.
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import product

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..core.blocking import purge_blocks, token_block_index, token_pairs
from ..core.names import entity_names, name_pairs, top_k_name_attrs
from ..core.tokens import TOKEN_SPLIT, literal_tokens

MEASURES = ("cosine", "jaccard", "genjaccard", "sigma")


def entity_grams(triples: DataFrame, n: int) -> DataFrame:
    """``(eid, gram, tf)`` — word n-grams per entity with term frequencies.

    N-grams are built within each literal value (they do not span
    values), joined with ``_`` so a gram is a single blocking-style key.
    """
    toks = (
        triples.filter(F.col("val").isNotNull())
        .select(
            "eid",
            F.split(F.lower(F.col("val")), TOKEN_SPLIT).alias("raw"),
        )
        .select("eid", F.expr("filter(raw, t -> t != '')").alias("toks"))
        .filter(F.size("toks") >= n)
    )
    grams = toks.select(
        "eid",
        F.explode(
            F.expr(
                f"transform(sequence(0, size(toks) - {n}),"
                f" i -> concat_ws('_', slice(toks, i + 1, {n})))"
            )
        ).alias("gram"),
    )
    return grams.groupBy("eid", "gram").agg(F.count("*").alias("tf"))


def weighted_grams(
    g1: DataFrame, g2: DataFrame, weighting: str
) -> tuple[DataFrame, DataFrame]:
    """Attach ``w`` to each (eid, gram): TF, or TF-IDF over both KBs.

    IDF uses the combined corpus (every entity of either KB is a
    document): ``idf = ln(N / df)``.
    """
    if weighting == "tf":
        return g1.withColumn("w", F.col("tf").cast("double")), g2.withColumn(
            "w", F.col("tf").cast("double")
        )
    if weighting != "tfidf":
        raise ValueError(f"unknown weighting {weighting!r}")
    n_docs = (
        g1.select("eid").distinct().count() + g2.select("eid").distinct().count()
    )
    df = (
        g1.select("eid", "gram")
        .union(g2.select("eid", "gram"))
        .groupBy("gram")
        .agg(F.countDistinct("eid").alias("df"))
        .withColumn("idf", F.log(F.lit(float(n_docs)) / F.col("df")))
        .select("gram", "idf")
    )

    def attach(g: DataFrame) -> DataFrame:
        return g.join(df, "gram").withColumn("w", F.col("tf") * F.col("idf"))

    return attach(g1), attach(g2)


def pair_similarities(
    pairs: DataFrame, g1: DataFrame, g2: DataFrame
) -> DataFrame:
    """All four similarity measures for every candidate pair, in one pass.

    Per-pair common-gram statistics (dot product, sum of minima, counts)
    combine with per-entity norms to give:

    * cosine     = dot / (||A|| * ||B||)
    * jaccard    = |common| / (|A| + |B| - |common|)
    * genjaccard = sum_min / (sum_A + sum_B - sum_min)
    * sigma      = sum_common (wA + wB) / (sum_A + sum_B)  [21]
    """
    a1 = g1.groupBy("eid").agg(
        F.sum("w").alias("sum1"),
        F.sum(F.col("w") * F.col("w")).alias("sq1"),
        F.count("*").alias("n1"),
    )
    a2 = g2.groupBy("eid").agg(
        F.sum("w").alias("sum2"),
        F.sum(F.col("w") * F.col("w")).alias("sq2"),
        F.count("*").alias("n2"),
    )
    common = (
        pairs.join(
            g1.select(F.col("eid").alias("eid1"), "gram", F.col("w").alias("w1")),
            "eid1",
        )
        .join(
            g2.select(F.col("eid").alias("eid2"), "gram", F.col("w").alias("w2")),
            ["eid2", "gram"],
        )
        .groupBy("eid1", "eid2")
        .agg(
            F.sum(F.col("w1") * F.col("w2")).alias("dot"),
            F.sum(F.least("w1", "w2")).alias("cmin"),
            F.sum(F.col("w1") + F.col("w2")).alias("csum"),
            F.count("*").alias("c"),
        )
    )
    return (
        common.join(a1.withColumnRenamed("eid", "eid1"), "eid1")
        .join(a2.withColumnRenamed("eid", "eid2"), "eid2")
        .select(
            "eid1",
            "eid2",
            (F.col("dot") / (F.sqrt("sq1") * F.sqrt("sq2"))).alias("cosine"),
            (F.col("c") / (F.col("n1") + F.col("n2") - F.col("c"))).alias(
                "jaccard"
            ),
            (
                F.col("cmin") / (F.col("sum1") + F.col("sum2") - F.col("cmin"))
            ).alias("genjaccard"),
            (F.col("csum") / (F.col("sum1") + F.col("sum2"))).alias("sigma"),
        )
    )


def candidate_pairs_unpruned(
    triples1: DataFrame, triples2: DataFrame, k_names: int = 2
) -> DataFrame:
    """The unpruned disjunctive blocking graph's edges, as in the paper's BSL."""
    t1, t2 = literal_tokens(triples1), literal_tokens(triples2)
    kept, _ = purge_blocks(token_block_index(t1, t2))
    tok = token_pairs(t1, t2, kept)
    n1 = entity_names(triples1, top_k_name_attrs(triples1, k_names))
    n2 = entity_names(triples2, top_k_name_attrs(triples2, k_names))
    return tok.union(name_pairs(n1, n2)).distinct()


@dataclass
class BSLResult:
    """Best configuration and score of the BSL grid search."""

    n: int
    weighting: str
    measure: str
    threshold: float
    precision: float
    recall: float
    f1: float
    grid: pd.DataFrame  # one row per (n, weighting, measure, threshold)


def _prf(pred: pd.DataFrame, gt: pd.DataFrame) -> tuple[float, float, float]:
    n_m = len(pred)
    n_gt = len(gt)
    if n_m == 0 or n_gt == 0:
        return 0.0, 0.0, 0.0
    hit = len(pred.merge(gt, on=["eid1", "eid2"]))
    p = 100.0 * hit / n_m
    r = 100.0 * hit / n_gt
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return p, r, f1


def run_bsl(
    triples1: DataFrame,
    triples2: DataFrame,
    gt_pdf: pd.DataFrame,
    ns: tuple[int, ...] = (1, 2, 3),
    weightings: tuple[str, ...] = ("tf", "tfidf"),
    measures: tuple[str, ...] = MEASURES,
    thresholds: np.ndarray | None = None,
) -> BSLResult:
    """Grid-search BSL and return the best-F1 configuration.

    ``gt_pdf`` is the pandas ground truth (the sweep runs driver-side).
    """
    from ..baselines.umc import unique_mapping_clustering

    if thresholds is None:
        thresholds = np.arange(0.0, 1.0, 0.05)
    pairs = candidate_pairs_unpruned(triples1, triples2).cache()
    rows: list[dict] = []
    for n, weighting in product(ns, weightings):
        g1 = entity_grams(triples1, n)
        g2 = entity_grams(triples2, n)
        w1, w2 = weighted_grams(g1, g2, weighting)
        sims = pair_similarities(pairs, w1, w2).toPandas()
        for measure in measures:
            if measure == "sigma" and weighting != "tfidf":
                continue  # SiGMa measure applies to TF-IDF only [21]
            scored = sims[["eid1", "eid2", measure]].rename(
                columns={measure: "sim"}
            )
            scored = scored[scored.sim > 0]
            for t in thresholds:
                pred = unique_mapping_clustering(scored, float(t))
                p, r, f1 = _prf(pred, gt_pdf)
                rows.append(
                    {
                        "n": n,
                        "weighting": weighting,
                        "measure": measure,
                        "threshold": round(float(t), 2),
                        "precision": p,
                        "recall": r,
                        "f1": f1,
                    }
                )
    grid = pd.DataFrame(rows)
    best = grid.loc[grid.f1.idxmax()]
    return BSLResult(
        n=int(best.n),
        weighting=str(best.weighting),
        measure=str(best.measure),
        threshold=float(best.threshold),
        precision=float(best.precision),
        recall=float(best.recall),
        f1=float(best.f1),
        grid=grid,
    )
