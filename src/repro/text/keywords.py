"""Title → keyword extraction as Spark dataflow.

The paper's γ₃/γ₄ use title *keywords*: tokens minus stop words and minus
the most frequent title words. ``FB(b)`` (corpus frequency of keyword b,
eq. 7) comes from the same pass.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.dblp.generator import STOPWORDS


def title_tokens(papers: DataFrame) -> DataFrame:
    """(paper_id, token) rows: lower-cased whitespace tokens of the title."""
    return papers.select(
        "paper_id",
        F.explode(F.split(F.lower(F.col("title")), r"\s+")).alias("token"),
    ).where(F.col("token") != "")


def keywords(
    papers: DataFrame,
    *,
    extra_stopwords: tuple[str, ...] = (),
    top_frequent_cut: float = 0.02,
) -> DataFrame:
    """(paper_id, keyword) rows after stop-word and frequency filtering.

    ``top_frequent_cut``: tokens appearing in more than this fraction of
    papers are dropped (the paper excludes "the frequent words in paper
    titles"; generic filler words carry no interest signal).
    """
    toks = title_tokens(papers)
    stop = set(STOPWORDS) | set(extra_stopwords)
    toks = toks.where(~F.col("token").isin(*sorted(stop)))
    n_papers = papers.count()
    doc_freq = (
        toks.groupBy("token")
        .agg(F.countDistinct("paper_id").alias("df"))
        .where(F.col("df") <= top_frequent_cut * n_papers)
    )
    return (
        toks.join(doc_freq.select("token"), "token")
        .select("paper_id", F.col("token").alias("keyword"))
        .dropDuplicates(["paper_id", "keyword"])
    )


def keyword_frequencies(kw: DataFrame) -> DataFrame:
    """FB(b): number of papers whose title contains keyword b."""
    return kw.groupBy("keyword").agg(F.countDistinct("paper_id").alias("fb"))
