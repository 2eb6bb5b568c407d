"""Evaluation metrics (paper §5 "Measures of success").

Precision / recall / F1 of the k top-ranked homograph candidates, and the
full top-k curve of Figure 7, computed in the DataFrame API with window
functions so the whole ranking never has to leave Spark.
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def topk_curve(
    scored: DataFrame,
    *,
    score_col: str,
    label_col: str = "label",
    truth_col: str = "is_homograph",
    ascending: bool = False,
) -> DataFrame:
    """Cumulative precision/recall/F1 at every rank.

    ``scored`` must have one row per candidate value with its score and a
    boolean ground-truth column. Ties are broken deterministically by
    label. Returns ``(rank, label, score, is_homograph, tp, precision,
    recall, f1)`` ordered by rank.
    """
    order = [
        F.col(score_col).asc() if ascending else F.col(score_col).desc(),
        F.col(label_col).asc(),
    ]
    w = Window.orderBy(*order)
    cum = w.rowsBetween(Window.unboundedPreceding, Window.currentRow)
    n_true = scored.where(F.col(truth_col)).count()
    ranked = (
        scored.withColumn("rank", F.row_number().over(w))
        .withColumn("tp", F.sum(F.col(truth_col).cast("long")).over(cum))
        .withColumn("precision", F.col("tp") / F.col("rank"))
        .withColumn("recall", F.col("tp") / F.lit(max(n_true, 1)))
    )
    return ranked.withColumn(
        "f1",
        F.when(
            F.col("precision") + F.col("recall") > 0,
            2 * F.col("precision") * F.col("recall")
            / (F.col("precision") + F.col("recall")),
        ).otherwise(F.lit(0.0)),
    ).select("rank", label_col, score_col, truth_col, "tp", "precision", "recall", "f1")


def metrics_at_k(curve: DataFrame, k: int) -> dict:
    """Precision/recall/F1 at rank ``k`` from a :func:`topk_curve` result.

    If the curve has fewer than ``k`` rows (fewer candidates than ``k``),
    the last row is used and precision is re-based on ``k`` slots — the
    paper's convention when an algorithm returns fewer than k results
    (D4 on SB returns 21 candidates, scored against 55 slots).
    """
    rows = curve.where(F.col("rank") <= k).orderBy(F.col("rank").desc()).limit(1).collect()
    if not rows:
        return {"k": k, "precision": 0.0, "recall": 0.0, "f1": 0.0, "tp": 0}
    r = rows[0]
    tp = int(r["tp"])
    precision = tp / k
    recall = float(r["recall"])
    f1 = 2 * precision * recall / (precision + recall) if precision + recall else 0.0
    return {"k": k, "precision": precision, "recall": recall, "f1": f1, "tp": tp}


def best_f1(curve: DataFrame) -> dict:
    """Rank with the highest F1 on the curve (paper §5.3 reports it)."""
    r = curve.orderBy(F.col("f1").desc(), F.col("rank").asc()).limit(1).collect()[0]
    return {
        "k": int(r["rank"]),
        "precision": float(r["precision"]),
        "recall": float(r["recall"]),
        "f1": float(r["f1"]),
        "tp": int(r["tp"]),
    }


def hits_in_topk(curve: DataFrame, k: int, targets: DataFrame | list) -> int:
    """How many of ``targets`` (labels) rank in the top ``k`` — the
    Table 2 / Table 3 measure for injected homographs."""
    top = curve.where(F.col("rank") <= k).select("label")
    if isinstance(targets, list):
        spark = curve.sparkSession
        import pandas as pd

        targets = spark.createDataFrame(
            pd.DataFrame({"label": list(targets)}), schema="label string"
        )
    return top.join(targets.select("label").distinct(), on="label").count()
