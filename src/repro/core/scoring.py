"""Distributed classifier application (the "apply classifier over blocks"
half of Algorithm 4).

The trained DeepER head is tiny (two dense layers), so it is broadcast to
the executors and applied over the candidate-pair DataFrame produced by the
LSH blocker: join candidate ids with the two vector tables, compute the
per-attribute cosine similarity vector, and run the dense head — all inside
``mapInPandas``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.model import AvgDeepER
from repro.core.similarity import per_attribute_cosine

_SCORE_SCHEMA = T.StructType([
    T.StructField("id_a", T.StringType()),
    T.StructField("id_b", T.StringType()),
    T.StructField("prob", T.DoubleType()),
])


def export_head(model: AvgDeepER) -> dict:
    """Plain-numpy snapshot of the trained head for broadcasting."""
    return {
        "W1": model.dense.params["W"].copy(),
        "b1": model.dense.params["b"].copy(),
        "W2": model.clf.params["W"].copy(),
        "b2": model.clf.params["b"].copy(),
    }


def _head_forward(weights: dict, X: np.ndarray) -> np.ndarray:
    h = np.tanh(X @ weights["W1"] + weights["b1"])
    z = h @ weights["W2"] + weights["b2"]
    return 1.0 / (1.0 + np.exp(-z[:, 0]))


def score_candidates_spark(cands: DataFrame, vec_a: DataFrame,
                           vec_b: DataFrame, model: AvgDeepER,
                           m: int, d: int) -> DataFrame:
    """``(id_a, id_b)`` candidates -> ``(id_a, id_b, prob)``.

    ``vec_a`` / ``vec_b`` are ``(id, vec)`` DataFrames from
    :func:`repro.core.compose.avg_tuple_vectors_spark`.
    """
    spark = cands.sparkSession
    bc = spark.sparkContext.broadcast(export_head(model))

    joined = (
        cands
        .join(vec_a.select(F.col("id").alias("id_a"),
                           F.col("vec").alias("vec_a")), on="id_a")
        .join(vec_b.select(F.col("id").alias("id_b"),
                           F.col("vec").alias("vec_b")), on="id_b")
    )

    def score(iterator):
        w = bc.value
        for pdf in iterator:
            if len(pdf) == 0:
                continue
            va = np.asarray(pdf["vec_a"].tolist())
            vb = np.asarray(pdf["vec_b"].tolist())
            X = per_attribute_cosine(va, vb, m, d)
            yield pd.DataFrame({"id_a": pdf["id_a"], "id_b": pdf["id_b"],
                                "prob": _head_forward(w, X)})

    return joined.mapInPandas(score, schema=_SCORE_SCHEMA)
