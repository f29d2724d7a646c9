"""Cuisine food-pairing Z-scores against the Random Cuisine (Fig. 4).

For each region the paper computes

    Z = sqrt(n_rand) · (N_s^C − N_s^rand) / σ_rand

with n_rand = 100,000 randomized recipes.  The same statistic is
computed for each of the other randomized models (frequency, category,
frequency+category) to ask which factors *reproduce* the real cuisine's
deviation: a model whose Z matches the real cuisine's Z explains the
pattern; one near 0 does not.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.pairing import cuisine_scores, recipe_scores_fast
from repro.core.randomize import MODELS, RegionInputs, random_recipes, region_model_inputs


def _cuisine_stats(recipes: DataFrame, matrix: np.ndarray) -> pd.DataFrame:
    """(region, ns, sigma, n_recipes) for a recipe DataFrame."""
    return cuisine_scores(recipe_scores_fast(recipes, matrix)).toPandas()


def food_pairing_table(
    spark: SparkSession,
    corpus: DataFrame,
    matrix: np.ndarray,
    *,
    n_rand: int = 100_000,
    seed: int = 17,
    models: tuple[str, ...] = MODELS,
    inputs: dict[str, RegionInputs] | None = None,
) -> pd.DataFrame:
    """The Fig. 4 experiment as a table.

    Columns: region, ns_real, ns_random, sigma_random, z_real, then
    ns_<model> / z_<model> for every non-random model, and ``pairing``
    ('uniform' for Z > 0, 'contrasting' for Z < 0).

    ``matrix`` is the broadcast overlap matrix from
    :func:`repro.core.pairing.shared_matrix`.
    """
    if "random" not in models:
        raise ValueError("the Random Cuisine baseline is required")
    if inputs is None:
        inputs = region_model_inputs(spark, corpus)

    real = _cuisine_stats(corpus, matrix).rename(
        columns={"ns": "ns_real", "sigma": "sigma_real", "n_recipes": "n_recipes_real"}
    )
    model_stats: dict[str, pd.DataFrame] = {}
    for model in models:
        model_stats[model] = _cuisine_stats(
            random_recipes(spark, inputs, model, n_rand, seed), matrix
        )

    rand = model_stats["random"].rename(
        columns={"ns": "ns_random", "sigma": "sigma_random"}
    )[["region", "ns_random", "sigma_random"]]
    out = real.merge(rand, on="region")
    out["z_real"] = (
        np.sqrt(n_rand) * (out["ns_real"] - out["ns_random"]) / out["sigma_random"]
    )
    for model in models:
        if model == "random":
            continue
        ms = model_stats[model].rename(columns={"ns": f"ns_{model}"})[
            ["region", f"ns_{model}"]
        ]
        out = out.merge(ms, on="region")
        out[f"z_{model}"] = (
            np.sqrt(n_rand)
            * (out[f"ns_{model}"] - out["ns_random"])
            / out["sigma_random"]
        )
    out["pairing"] = np.where(out["z_real"] > 0, "uniform", "contrasting")
    return out.sort_values("region").reset_index(drop=True)
