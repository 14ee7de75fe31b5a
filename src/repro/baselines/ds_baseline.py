"""CERES-Baseline — classic pairwise distant supervision (§5.2).

The original distant-supervision assumption applied to DOM trees:
every pair of entity mentions on a page that matches a KB triple
becomes a training pair; a pair classifier (features of both nodes
concatenated) predicts relations; extraction scores node *pairs*.

The paper reports this baseline runs out of memory on the Movie
vertical (32 GB): the number of candidate pairs is quadratic in page
mentions. We reproduce that failure mode deterministically with an
explicit pair budget — exceeding it raises :class:`PairBudgetExceeded`,
which the Table 3 harness records as ``NA``.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.extract import NAME_LABEL  # noqa: F401  (re-export convenience)
from repro.core.matching import page_mentions
from repro.core.model import NodeClassifier
from repro.core.negatives import OTHER_LABEL
from repro.kb.schema import NAME_PREDICATES


class PairBudgetExceeded(RuntimeError):
    """Raised when candidate pairs exceed the configured memory proxy."""


@dataclass(frozen=True)
class BaselineConfig:
    pair_budget: int = 2_000_000
    neg_ratio: int = 3
    threshold: float = 0.5
    reg_param: float = 1e-3
    max_iter: int = 60
    hash_dim: int = 1 << 16


def _pair_count(mentions: DataFrame) -> int:
    per_page = mentions.groupBy("grp", "page_id").agg(F.count("*").alias("n"))
    row = per_page.agg(F.sum(F.col("n") * F.col("n")).alias("pairs")).collect()[0]
    return int(row["pairs"] or 0)


def pair_annotations(mentions: DataFrame, kb_df: DataFrame) -> DataFrame:
    """All mention pairs matching a KB triple: the classic DS labels."""
    m1 = mentions.select(
        "grp", "page_id", F.col("xpath").alias("xpath1"), F.col("norm").alias("subject_norm")
    )
    m2 = mentions.select(
        "grp", "page_id", F.col("xpath").alias("xpath2"), F.col("norm").alias("object_norm")
    )
    kb_pairs = kb_df.select("subject_norm", "predicate", "object_norm").where(
        ~F.col("predicate").isin(list(NAME_PREDICATES))
    ).distinct()
    return (
        m1.join(m2, on=["grp", "page_id"])
        .where(F.col("xpath1") != F.col("xpath2"))
        .join(kb_pairs, on=["subject_norm", "object_norm"])
        .select("grp", "page_id", "xpath1", "xpath2", "predicate")
        .distinct()
    )


def _pair_features(pairs: DataFrame, features: DataFrame, dim: int) -> DataFrame:
    """Concatenate node features: node2's indices are offset by ``dim``."""
    f1 = features.select(
        "grp", "site", "page_id", F.col("xpath").alias("xpath1"),
        F.col("features").alias("fa"), F.col("text").alias("subject_text"),
    )
    f2 = features.select(
        "grp", "page_id", F.col("xpath").alias("xpath2"),
        F.col("features").alias("fb"), F.col("text").alias("object_text"),
    )
    combine = F.udf(
        lambda a, b: sorted(set(list(a or []) + [int(i) + dim for i in (b or [])])),
        "array<int>",
    )
    return (
        pairs.join(f1, on=["grp", "page_id", "xpath1"])
        .join(f2, on=["grp", "page_id", "xpath2"])
        .withColumn("features", combine("fa", "fb"))
        .drop("fa", "fb")
    )


def run_baseline(
    spark: SparkSession,
    nodes: DataFrame,
    features: DataFrame,
    kb_df: DataFrame,
    *,
    train_pages: set | None = None,
    eval_pages: set | None = None,
    config: BaselineConfig = BaselineConfig(),
) -> pd.DataFrame:
    """Train and run the pairwise DS extractor; returns extraction rows.

    Subject/object strings come from the matched nodes themselves (the
    baseline has no topic concept). Candidate extraction pairs are
    limited to KB-matched mentions, as in §5.2.
    """
    mentions = page_mentions(nodes, kb_df).cache()
    if _pair_count(mentions) > config.pair_budget:
        raise PairBudgetExceeded(
            f"candidate pairs exceed budget {config.pair_budget}"
        )
    train_mentions = (
        mentions
        if train_pages is None
        else mentions.where(F.col("page_id").isin(list(train_pages)))
    )
    positives = pair_annotations(train_mentions, kb_df).cache()

    # Negative pairs: co-mentions with no KB relation.
    m1 = train_mentions.select(
        "grp", "page_id", F.col("xpath").alias("xpath1"), F.col("norm").alias("n1")
    )
    m2 = train_mentions.select(
        "grp", "page_id", F.col("xpath").alias("xpath2"), F.col("norm").alias("n2")
    )
    all_pairs = (
        m1.join(m2, on=["grp", "page_id"])
        .where(F.col("xpath1") != F.col("xpath2"))
        .select("grp", "page_id", "xpath1", "xpath2")
        .distinct()
    )
    n_pos = positives.count()
    negatives = (
        all_pairs.join(positives, on=["grp", "page_id", "xpath1", "xpath2"], how="left_anti")
        .orderBy("grp", "page_id", "xpath1", "xpath2")  # deterministic head
        .limit(int(config.neg_ratio * max(1, n_pos)))
        .withColumn("predicate", F.lit(OTHER_LABEL))
    )
    examples = positives.unionByName(negatives)

    dim2 = config.hash_dim * 2
    train = _pair_features(examples, features, config.hash_dim).withColumnRenamed(
        "predicate", "label"
    )

    results = []
    grps = [r["grp"] for r in examples.select("grp").distinct().collect()]
    for grp in sorted(grps):
        g_train = train.where(F.col("grp") == grp)
        labels = sorted(
            {r["label"] for r in g_train.select("label").distinct().collect()}
            | {OTHER_LABEL}
        )
        if len(labels) < 2:
            continue
        clf = NodeClassifier(
            labels=labels,
            dim=dim2,
            reg_param=config.reg_param,
            max_iter=config.max_iter,
        )
        # Pair vectors: reuse the node classifier on concatenated features.
        clf.fit(g_train.select("grp", "page_id", "features", "label"))

        ev_mentions = (
            mentions
            if eval_pages is None
            else mentions.where(F.col("page_id").isin(list(eval_pages)))
        ).where(F.col("grp") == grp)
        cand = (
            ev_mentions.select("grp", "page_id", F.col("xpath").alias("xpath1"))
            .join(
                ev_mentions.select("grp", "page_id", F.col("xpath").alias("xpath2")),
                on=["grp", "page_id"],
            )
            .where(F.col("xpath1") != F.col("xpath2"))
            .distinct()
        )
        if cand.count() > config.pair_budget:
            raise PairBudgetExceeded("extraction pair explosion")
        scored_in = _pair_features(cand, features, config.hash_dim)
        scored = clf.predict(scored_in)
        results.append((scored.toPandas(), labels))

    rows = []
    for pdf, labels in results:
        for rec in pdf.itertuples(index=False):
            probs = list(rec.probs) + [0.0] * len(labels)
            best = max(range(len(labels)), key=lambda i: probs[i])
            if labels[best] == OTHER_LABEL or probs[best] < config.threshold:
                continue
            rows.append(
                (
                    rec.grp,
                    rec.site,
                    rec.page_id,
                    rec.subject_text,
                    labels[best],
                    rec.object_text,
                    float(probs[best]),
                )
            )
    return pd.DataFrame(
        rows,
        columns=["grp", "site", "page_id", "subject", "predicate", "object", "confidence"],
    ).drop_duplicates()
