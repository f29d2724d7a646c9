"""Food-pairing scores (paper Methodology §B).

For a recipe R with n ingredients,

    N_s^R = 2 / (n (n-1)) · Σ_{i<j ∈ R} |F_i ∩ F_j|

i.e. the mean shared-flavor-molecule count over unordered ingredient
pairs; the cuisine score N_s^C is the mean of N_s^R over recipes.

Two implementations, cross-checked by tests and the DuckDB oracle:

* **join path** — `shared_pairs` self-joins the long-format profile
  DataFrame on molecule_id to produce |F_i ∩ F_j| per pair, then
  `recipe_scores_join` self-joins the exploded corpus per recipe and
  aggregates.  Pure Catalyst dataflow; exercises shuffle joins.
* **fast path** — the pair table is collected into a dense
  (N+1)×(N+1) int32 matrix (≈3.6 MB), broadcast to executors, and
  `recipe_scores_fast` scores recipe batches with one vectorized NumPy
  gather per batch.  This is what makes 100,000-recipe randomized
  cuisines per model per region tractable.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import DoubleType, StructField, StructType

from repro.flavordb.ingredients import N_INGREDIENTS

#: Padding slot used by the vectorized scorer; row/column is all zeros.
PAD_ID = N_INGREDIENTS


def shared_pairs(profiles: DataFrame) -> DataFrame:
    """|F_i ∩ F_j| for every ingredient pair i < j with nonzero overlap.

    Columns: ``i``, ``j``, ``shared``.  Pairs that share no molecule are
    absent (consumers must treat missing as 0).
    """
    a = profiles.select(
        F.col("ingredient_id").alias("i"), F.col("molecule_id").alias("m")
    )
    b = profiles.select(
        F.col("ingredient_id").alias("j"), F.col("molecule_id").alias("m")
    )
    return (
        a.join(b, on="m")
        .where(F.col("i") < F.col("j"))
        .groupBy("i", "j")
        .agg(F.count("*").alias("shared"))
    )


def shared_matrix(spark: SparkSession, profiles: DataFrame) -> np.ndarray:
    """Dense symmetric overlap matrix from :func:`shared_pairs`.

    Shape (N_INGREDIENTS+1, N_INGREDIENTS+1); index ``PAD_ID`` is an
    all-zero padding slot and the diagonal is zero.
    """
    pdf = shared_pairs(profiles).toPandas()
    s = np.zeros((N_INGREDIENTS + 1, N_INGREDIENTS + 1), dtype=np.int32)
    s[pdf["i"].to_numpy(), pdf["j"].to_numpy()] = pdf["shared"].to_numpy()
    return s + s.T


def recipe_scores_join(exploded: DataFrame, shared: DataFrame) -> DataFrame:
    """N_s^R per recipe via DataFrame joins.

    ``exploded`` has (recipe_id, region, n, ingredient_id); ``shared``
    comes from :func:`shared_pairs`.  Returns (recipe_id, region, n,
    score).  Zero-overlap pairs contribute 0 via the left join; recipes
    whose pairs all have zero overlap still appear (score 0) because the
    pair self-join always produces n(n-1)/2 rows per recipe.
    """
    left = exploded.select(
        "recipe_id", "region", "n", F.col("ingredient_id").alias("i")
    )
    right = exploded.select("recipe_id", F.col("ingredient_id").alias("j"))
    pairs = left.join(right, on="recipe_id").where(F.col("i") < F.col("j"))
    scored = pairs.join(shared, on=["i", "j"], how="left").withColumn(
        "shared", F.coalesce(F.col("shared"), F.lit(0))
    )
    return scored.groupBy("recipe_id", "region", "n").agg(
        (F.sum("shared") * 2.0 / (F.first("n") * (F.first("n") - 1))).alias("score")
    )


def recipe_scores_fast(recipes: DataFrame, matrix: np.ndarray) -> DataFrame:
    """N_s^R per recipe via the broadcast overlap matrix.

    ``recipes`` must carry ``ingredients`` (array) and ``n``; output is
    the input schema plus a ``score`` column.  The matrix is shipped with
    ``SparkContext.broadcast`` (one copy per executor, not per task).
    """
    spark = recipes.sparkSession
    bc = spark.sparkContext.broadcast(matrix)
    # StructType.add mutates in place — copy the field list instead of
    # appending to the input DataFrame's live schema object.
    out_schema = StructType(
        list(recipes.schema.fields) + [StructField("score", DoubleType())]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        s = bc.value
        for pdf in batches:
            if len(pdf) == 0:
                continue
            sizes = pdf["n"].to_numpy()
            max_n = int(sizes.max())
            padded = np.full((len(pdf), max_n), PAD_ID, dtype=np.int64)
            for row, ing in enumerate(pdf["ingredients"]):
                padded[row, : len(ing)] = ing
            # Full gather counts each unordered pair twice; the diagonal
            # and padding rows are zero, so sum/(n(n-1)) is exactly N_s^R.
            gathered = s[padded[:, :, None], padded[:, None, :]]
            totals = gathered.sum(axis=(1, 2)).astype(np.float64)
            pdf = pdf.copy()
            pdf["score"] = totals / (sizes * (sizes - 1.0))
            yield pdf

    return recipes.mapInPandas(run, out_schema)


def cuisine_scores(recipe_scores: DataFrame) -> DataFrame:
    """Per-region N_s^C, recipe-score standard deviation and recipe count."""
    return recipe_scores.groupBy("region").agg(
        F.avg("score").alias("ns"),
        F.stddev_pop("score").alias("sigma"),
        F.count("*").alias("n_recipes"),
    )
