"""Multinomial logistic-regression node classifier (§4.2).

The paper trains scikit-learn's LogisticRegression (LBFGS, L2, C=1) per
website; we use ``pyspark.ml``'s multinomial LogisticRegression (also
LBFGS-optimised, L2 via regParam with elasticNetParam=0), trained per
site group on hashed sparse feature vectors.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.ml.classification import LogisticRegression
from pyspark.ml.functions import vector_to_array
from pyspark.ml.linalg import SparseVector, VectorUDT
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.features import HASH_DIM


def _to_vector_udf(dim: int):
    @F.udf(returnType=VectorUDT())
    def to_vec(indices):
        idx = sorted(set(int(i) for i in (indices or [])))
        return SparseVector(dim, idx, [1.0] * len(idx))

    return to_vec


@dataclass
class NodeClassifier:
    """One trained model for one site group, plus its label vocabulary."""

    labels: list  # index -> label string
    model: object = None
    dim: int = HASH_DIM
    reg_param: float = 1e-3
    max_iter: int = 80
    label_index: dict = field(init=False)

    def __post_init__(self):
        self.label_index = {lab: i for i, lab in enumerate(self.labels)}

    def fit(self, examples: DataFrame) -> "NodeClassifier":
        """Train on ``(features array<int>, label string)`` rows."""
        idx = self.label_index
        label_udf = F.udf(lambda s: float(idx[s]), "double")
        # Per-site training sets are small; one partition avoids paying
        # scheduler overhead on every LBFGS treeAggregate iteration.
        train = (
            examples.coalesce(1)
            .withColumn("features_vec", _to_vector_udf(self.dim)(F.col("features")))
            .withColumn("label_idx", label_udf(F.col("label")))
            .cache()
        )
        lr = LogisticRegression(
            featuresCol="features_vec",
            labelCol="label_idx",
            family="multinomial",
            regParam=self.reg_param,
            elasticNetParam=0.0,
            maxIter=self.max_iter,
            standardization=False,
        )
        self.model = lr.fit(train)
        return self

    def predict(self, features_df: DataFrame) -> DataFrame:
        """Score rows; adds ``probs`` (per-label array, self.labels order).

        All input columns are preserved (minus the ``features`` array),
        so callers can score node rows or pair rows alike. ``pyspark.ml``
        sizes the probability vector to the max label index seen in
        training; missing tail classes read as 0 (extract pads).
        """
        scored = self.model.transform(
            features_df.withColumn(
                "features_vec", _to_vector_udf(self.dim)(F.col("features"))
            )
        )
        return scored.withColumn("probs", vector_to_array("probability")).drop(
            "features_vec", "rawPrediction", "probability", "prediction", "features"
        )
