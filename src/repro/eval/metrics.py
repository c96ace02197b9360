"""Pairwise micro metrics (Section VI-A.2).

For every testing-set name, every unordered pair of (paper, name)
occurrences is classified same/different author by the method (cluster ids)
and by ground truth (author ids); TP/FP/FN/TN are totalled over all names
and MicroA/P/R/F computed from the totals. The Spark dataflow is a per-name
self-join; tests oracle-check the counts against the identical DuckDB SQL.
"""
from __future__ import annotations

import dataclasses

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclasses.dataclass
class Confusion:
    tp: int
    fp: int
    fn: int
    tn: int

    @property
    def micro_a(self) -> float:
        t = self.tp + self.fp + self.fn + self.tn
        return (self.tp + self.tn) / t if t else 0.0

    @property
    def micro_p(self) -> float:
        d = self.tp + self.fp
        return self.tp / d if d else 0.0

    @property
    def micro_r(self) -> float:
        d = self.tp + self.fn
        return self.tp / d if d else 0.0

    @property
    def micro_f(self) -> float:
        p, r = self.micro_p, self.micro_r
        return 2 * p * r / (p + r) if p + r else 0.0

    def as_row(self) -> dict:
        return {
            "MicroA": self.micro_a,
            "MicroP": self.micro_p,
            "MicroR": self.micro_r,
            "MicroF": self.micro_f,
        }


def labelled_pairs(labelled: DataFrame) -> DataFrame:
    """Per-name occurrence pairs with prediction/truth agreement flags.

    ``labelled``: (paper_id, name, cluster, author_id). Output columns:
    name, p1, p2, pred_same, true_same.
    """
    a = labelled.select(
        "name",
        F.col("paper_id").alias("p1"),
        F.col("cluster").alias("c1"),
        F.col("author_id").alias("a1"),
    )
    b = labelled.select(
        "name",
        F.col("paper_id").alias("p2"),
        F.col("cluster").alias("c2"),
        F.col("author_id").alias("a2"),
    )
    return (
        a.join(b, "name")
        .where(F.col("p1") < F.col("p2"))
        .select(
            "name",
            "p1",
            "p2",
            (F.col("c1") == F.col("c2")).alias("pred_same"),
            (F.col("a1") == F.col("a2")).alias("true_same"),
        )
    )


def confusion_df(labelled: DataFrame) -> DataFrame:
    """One-row DataFrame with tp/fp/fn/tn — oracle-comparable."""
    pr = labelled_pairs(labelled)
    one = lambda c: F.sum(F.when(c, 1).otherwise(0))  # noqa: E731
    return pr.agg(
        one(F.col("pred_same") & F.col("true_same")).alias("tp"),
        one(F.col("pred_same") & ~F.col("true_same")).alias("fp"),
        one(~F.col("pred_same") & F.col("true_same")).alias("fn"),
        one(~F.col("pred_same") & ~F.col("true_same")).alias("tn"),
    )


def confusion(labelled: DataFrame) -> Confusion:
    r = confusion_df(labelled).first()
    return Confusion(tp=r["tp"] or 0, fp=r["fp"] or 0, fn=r["fn"] or 0, tn=r["tn"] or 0)


def confusion_pandas(labelled: pd.DataFrame) -> Confusion:
    """Local twin for baselines that cluster in the driver: same definition
    over a pandas frame with columns (paper_id, name, cluster, author_id)."""
    tp = fp = fn = tn = 0
    for _, grp in labelled.groupby("name"):
        rows = grp[["paper_id", "cluster", "author_id"]].to_numpy()
        n = len(rows)
        for i in range(n):
            for j in range(i + 1, n):
                ps = rows[i][1] == rows[j][1]
                ts = rows[i][2] == rows[j][2]
                tp += ps and ts
                fp += ps and not ts
                fn += ts and not ps
                tn += not ps and not ts
    return Confusion(tp=int(tp), fp=int(fp), fn=int(fn), tn=int(tn))
