"""Weighted sampling without replacement as a Spark dataflow (§V-A).

Implements the Efraimidis–Spirakis A-Res scheme: each row draws
``key = u^(1/w)`` with ``u ~ U(0,1)``; the ``n`` largest keys form a
weighted sample without replacement. One shuffle (top-n) instead of ``n``
sequential draws — the standard distributed rendering of weighted
sampling.
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

_EPS = 1e-12


def weighted_sample_without_replacement(
    df: DataFrame, weight_col: str, n: int, seed: int
) -> DataFrame:
    """Sample ``n`` rows of ``df`` without replacement, P ∝ ``weight_col``.

    Zero/negative weights are clamped to a tiny positive value so every
    row remains sampleable (the paper's P_s(v) ∝ 1 − f(v,q) can reach 0
    for a maximally dissimilar node). Deterministic in ``seed``.
    """
    keyed = df.withColumn(
        "_akey",
        F.pow(
            F.rand(seed),
            1.0 / F.greatest(F.col(weight_col), F.lit(_EPS)),
        ),
    )
    w = Window.orderBy(F.col("_akey").desc())
    return (
        keyed.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") <= n)
        .drop("_akey", "_rn")
    )


def sampling_probabilities(fvals: DataFrame) -> DataFrame:
    """Eq. 5: ``P_s(v) = (1 − f(v,q)) / Σ_u (1 − f(u,q))`` over ``fvals``.

    Input ``id, f``; output ``id, f, p_s``.
    """
    total = fvals.agg(F.sum(1 - F.col("f")).alias("t"))
    return fvals.crossJoin(total).select(
        "id", "f", ((1 - F.col("f")) / F.col("t")).alias("p_s")
    )
