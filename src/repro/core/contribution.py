"""Ingredient contribution χ_i to cuisine food pairing (Fig. 5).

χ_i is the percentage change of N_s^C when ingredient i is removed from
the cuisine (Methodology §C): every recipe containing i loses i (its
pairs vanish and its size drops by one; 2-ingredient recipes drop out of
the average entirely, having no pairs left).

Rather than re-scoring the cuisine once per ingredient (O(#ingredients)
passes), the removal is computed exactly in one pass from the pair-level
decomposition:

    score'_R = 2 (S_R − T_{R,i}) / ((n−1)(n−2))     for recipes R ∋ i, n ≥ 3

where S_R is R's total pair overlap and T_{R,i} the overlap of pairs
involving i — both plain Spark aggregations over the per-recipe pair
table.
"""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from repro.flavordb.ingredients import ingredient_master


def _scored_pairs(exploded: DataFrame, shared: DataFrame) -> DataFrame:
    """(recipe_id, region, n, i, j, s) for every unordered recipe pair."""
    left = exploded.select(
        "recipe_id", "region", "n", F.col("ingredient_id").alias("i")
    )
    right = exploded.select("recipe_id", F.col("ingredient_id").alias("j"))
    return (
        left.join(right, on="recipe_id")
        .where(F.col("i") < F.col("j"))
        .join(shared, on=["i", "j"], how="left")
        .withColumn("s", F.coalesce(F.col("shared"), F.lit(0)))
        .drop("shared")
    )


def ingredient_contributions(exploded: DataFrame, shared: DataFrame) -> DataFrame:
    """χ_i for every (region, ingredient).

    Returns (region, ingredient_id, n_containing, ns_c, ns_without, chi)
    where ``chi`` = 100 · (N_s^C − N_s^{C∖i}) / N_s^C: positive χ means
    the ingredient pulls the cuisine's pairing score *up*.
    """
    pairs = _scored_pairs(exploded, shared)

    recipe_tot = pairs.groupBy("recipe_id", "region", "n").agg(
        F.sum("s").alias("s_r")
    )
    recipe_tot = recipe_tot.withColumn(
        "score", F.col("s_r") * 2.0 / (F.col("n") * (F.col("n") - 1))
    )
    region_tot = recipe_tot.groupBy("region").agg(
        F.sum("score").alias("total_score"), F.count("*").alias("n_r")
    )

    t_side = pairs.select(
        "recipe_id", F.col("i").alias("ingredient_id"), "s"
    ).unionByName(pairs.select("recipe_id", F.col("j").alias("ingredient_id"), "s"))
    t = t_side.groupBy("recipe_id", "ingredient_id").agg(F.sum("s").alias("t_ri"))

    member = (
        exploded.join(
            recipe_tot.select("recipe_id", "s_r", "score"), on="recipe_id"
        )
        .join(t, on=["recipe_id", "ingredient_id"], how="left")
        .withColumn("t_ri", F.coalesce(F.col("t_ri"), F.lit(0)))
        .withColumn(
            "adj_score",
            F.when(
                F.col("n") >= 3,
                (F.col("s_r") - F.col("t_ri"))
                * 2.0
                / ((F.col("n") - 1) * (F.col("n") - 2)),
            ),
        )
    )

    per_ing = member.groupBy("region", "ingredient_id").agg(
        F.count("*").alias("n_containing"),
        F.sum("score").alias("sum_orig"),
        F.sum("adj_score").alias("sum_adj"),
        F.sum(F.when(F.col("n") == 2, 1).otherwise(0)).alias("n_dropped"),
    )

    out = per_ing.join(region_tot, on="region")
    out = out.withColumn("ns_c", F.col("total_score") / F.col("n_r"))
    out = out.withColumn(
        "ns_without",
        F.when(
            F.col("n_r") - F.col("n_dropped") > 0,
            (
                F.col("total_score")
                - F.col("sum_orig")
                + F.coalesce(F.col("sum_adj"), F.lit(0.0))
            )
            / (F.col("n_r") - F.col("n_dropped")),
        ),
    )
    out = out.withColumn(
        "chi",
        F.when(
            F.col("ns_c") != 0,
            100.0 * (F.col("ns_c") - F.col("ns_without")) / F.col("ns_c"),
        ),
    )
    return out.select(
        "region", "ingredient_id", "n_containing", "ns_c", "ns_without", "chi"
    )


def top_contributors(
    contributions: DataFrame | pd.DataFrame, k: int = 3, signs: dict[str, int] | None = None
) -> pd.DataFrame:
    """Top-k contributing ingredients per region (Fig. 5).

    For positive-pairing regions the largest χ (ingredients pulling the
    score up); for negative-pairing ones the smallest χ (pulling it
    down).  ``signs`` maps region → ±1; default = the paper's Fig. 4
    signs from :mod:`repro.regions`.  Ingredient names are joined in
    for readability.
    """
    from repro.regions import REGIONS

    pdf = (
        contributions.toPandas()
        if isinstance(contributions, DataFrame)
        else contributions.copy()
    )
    if signs is None:
        signs = {r.code: r.pairing_sign for r in REGIONS}
    names = ingredient_master().set_index("ingredient_id")["name"]
    rows = []
    for region, g in pdf.dropna(subset=["chi"]).groupby("region"):
        sign = signs.get(region, 1)
        top = g.sort_values("chi", ascending=sign < 0).head(k)
        for rank, (_, row) in enumerate(top.iterrows(), start=1):
            rows.append(
                {
                    "region": region,
                    "rank": rank,
                    "ingredient_id": int(row["ingredient_id"]),
                    "ingredient": names.loc[int(row["ingredient_id"])],
                    "chi": row["chi"],
                }
            )
    return pd.DataFrame(rows)
