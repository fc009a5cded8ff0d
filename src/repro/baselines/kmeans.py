"""k-means baseline (centroid family) — Spark-native via ``pyspark.ml``.

The paper runs standard k-means with the correct k ("we similarly set the
correct k to achieve automatic clustering and ensure the best AMI
result"). We use MLlib's distributed Lloyd's implementation; features are
shipped as an array column and converted with ``array_to_vector``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.ml.clustering import KMeans
from pyspark.ml.functions import array_to_vector
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

__all__ = ["kmeans_spark"]


def _features_df(spark: SparkSession, X: np.ndarray):
    pdf = pd.DataFrame({"id": np.arange(len(X), dtype=np.int64), "arr": list(map(list, X))})
    return spark.createDataFrame(pdf).withColumn("features", array_to_vector(F.col("arr")))


def kmeans_spark(spark: SparkSession, X: np.ndarray, k: int, *, seed: int = 7) -> np.ndarray:
    """Cluster rows of X into k groups; returns labels aligned with rows."""
    df = _features_df(spark, np.asarray(X, dtype=np.float64))
    model = KMeans(k=k, seed=seed, featuresCol="features").fit(df)
    pred = model.transform(df).select("id", "prediction").toPandas()
    return pred.sort_values("id")["prediction"].to_numpy(dtype=np.int64)
