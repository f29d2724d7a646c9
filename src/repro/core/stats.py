"""Corpus statistics: Table 1, Fig. 2 and Fig. 3 as DataFrames.

All aggregations are Catalyst dataflow over the corpus; the functions
return Spark DataFrames (collect at the harness/test layer).
"""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession, Window

from repro.culinarydb.corpus import explode_corpus
from repro.flavordb.ingredients import ingredients_df
from repro.regions import REGIONS


def region_table(corpus: DataFrame) -> DataFrame:
    """Measured Table 1: recipes and unique ingredients per region."""
    return (
        explode_corpus(corpus)
        .groupBy("region")
        .agg(
            F.countDistinct("recipe_id").alias("recipes"),
            F.countDistinct("ingredient_id").alias("ingredients"),
        )
    )


def region_table_vs_paper(corpus: DataFrame) -> pd.DataFrame:
    """Measured Table 1 joined with the paper's published values."""
    measured = region_table(corpus).toPandas()
    paper = pd.DataFrame(
        [(r.code, r.name, r.recipes, r.ingredients) for r in REGIONS],
        columns=["region", "name", "paper_recipes", "paper_ingredients"],
    )
    out = paper.merge(measured, on="region", how="left")
    out["recipes_match"] = out["recipes"] == out["paper_recipes"]
    out["ingredients_match"] = out["ingredients"] == out["paper_ingredients"]
    return out


def category_shares(spark: SparkSession, corpus: DataFrame) -> DataFrame:
    """Fig. 2: share of ingredient *usage* per category per region.

    A usage is one (recipe, ingredient) occurrence; shares sum to 1 per
    region.  Join against the ingredient master gives the category.
    """
    cats = ingredients_df(spark).select("ingredient_id", "category")
    usage = explode_corpus(corpus).join(cats, on="ingredient_id")
    counts = usage.groupBy("region", "category").count()
    totals = Window.partitionBy("region")
    return counts.withColumn(
        "share", F.col("count") / F.sum("count").over(totals)
    )


def world_category_shares(spark: SparkSession, corpus: DataFrame) -> DataFrame:
    """Fig. 2's WORLD aggregate row (all regions pooled)."""
    cats = ingredients_df(spark).select("ingredient_id", "category")
    usage = explode_corpus(corpus).join(cats, on="ingredient_id")
    counts = usage.groupBy("category").count()
    total = usage.count()
    return counts.withColumn("share", F.col("count") / F.lit(float(total)))


def recipe_size_histogram(corpus: DataFrame, per_region: bool = False) -> DataFrame:
    """Fig. 3a: recipe-size distribution (global or per region)."""
    keys = ["region", "n"] if per_region else ["n"]
    out = corpus.groupBy(*keys).count()
    totals = Window.partitionBy("region") if per_region else Window.partitionBy()
    return out.withColumn("p", F.col("count") / F.sum("count").over(totals))


def recipe_size_summary(corpus: DataFrame) -> DataFrame:
    """Mean / max / p99 recipe size per region (thin-tail check)."""
    return corpus.groupBy("region").agg(
        F.avg("n").alias("mean_n"),
        F.expr("percentile(n, 0.99)").alias("p99_n"),
        F.max("n").alias("max_n"),
        F.count("*").alias("recipes"),
    )


def rank_frequency(corpus: DataFrame) -> DataFrame:
    """Fig. 3b: ingredient popularity rank vs normalized frequency.

    Per region, ingredients ranked by usage count (rank 1 = most used);
    ``rel_freq`` is the count normalized by the most popular
    ingredient's, ``rel_rank`` the rank normalized by the region's
    ingredient count — the paper's curves collapse on these axes.
    """
    counts = (
        explode_corpus(corpus).groupBy("region", "ingredient_id").count()
    )
    w = Window.partitionBy("region").orderBy(F.desc("count"), F.asc("ingredient_id"))
    ranked = counts.withColumn("rank", F.row_number().over(w))
    per_region = Window.partitionBy("region")
    return (
        ranked.withColumn("max_count", F.max("count").over(per_region))
        .withColumn("n_ingredients", F.count("*").over(per_region))
        .withColumn("rel_freq", F.col("count") / F.col("max_count"))
        .withColumn("rel_rank", F.col("rank") / F.col("n_ingredients"))
        .select("region", "ingredient_id", "rank", "count", "rel_freq", "rel_rank")
    )
