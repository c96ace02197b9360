"""Corpus-internal word vectors: PPMI + truncated SVD.

The paper uses pretrained language-model vectors (Word2Vec/GloVe/BERT) for
γ₃. No pretrained models exist offline, so we build distributional vectors
from the corpus itself: co-occurrence of keywords within titles → positive
PMI → SVD. This preserves the property γ₃ relies on — cosine similarity
reflects topical relatedness — and is the classic count-based equivalent of
Word2Vec (Levy & Goldberg 2014 show SGNS factorises shifted PMI).

Co-occurrence counting is Spark dataflow (self-join per paper); the PPMI/SVD
factorisation of the small vocab×vocab matrix runs in numpy on the driver.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

MAX_VOCAB = 6000


def cooccurrence(kw: DataFrame) -> DataFrame:
    """(w1, w2, cnt) for unordered keyword pairs sharing a title (w1 < w2)."""
    a = kw.select("paper_id", F.col("keyword").alias("w1"))
    b = kw.select("paper_id", F.col("keyword").alias("w2"))
    return (
        a.join(b, "paper_id")
        .where(F.col("w1") < F.col("w2"))
        .groupBy("w1", "w2")
        .agg(F.count("*").alias("cnt"))
    )


def word_vectors(kw: DataFrame, *, dim: int = 64) -> pd.DataFrame:
    """Dense word vectors for every keyword; columns ``keyword, vec``.

    Vocabulary is capped at the MAX_VOCAB most frequent keywords; words
    outside the cap get no vector (γ₃ averages over covered words only).
    """
    counts = (
        kw.groupBy("keyword").agg(F.count("*").alias("n")).orderBy(F.desc("n"))
    )
    vocab = [r["keyword"] for r in counts.limit(MAX_VOCAB).collect()]
    index = {w: i for i, w in enumerate(vocab)}
    V = len(vocab)
    if V == 0:
        return pd.DataFrame({"keyword": [], "vec": []})

    co = cooccurrence(kw).collect()
    M = np.zeros((V, V))
    for r in co:
        i, j = index.get(r["w1"]), index.get(r["w2"])
        if i is not None and j is not None:
            M[i, j] += r["cnt"]
            M[j, i] += r["cnt"]

    # PPMI with add-one smoothing on the marginals to avoid log(0).
    total = M.sum() or 1.0
    row = M.sum(axis=1, keepdims=True)
    with np.errstate(divide="ignore", invalid="ignore"):
        pmi = np.log((M * total) / (row @ row.T + 1e-12) + 1e-12)
    ppmi = np.maximum(pmi, 0.0)

    d = min(dim, V)
    # Economy SVD of the (small, dense) PPMI matrix.
    u, s, _ = np.linalg.svd(ppmi, full_matrices=False)
    vecs = u[:, :d] * np.sqrt(s[:d])
    return pd.DataFrame({"keyword": vocab, "vec": [vecs[i].astype(np.float64) for i in range(V)]})


def mean_vector(vectors: dict[str, np.ndarray], words: list[str], dim: int) -> np.ndarray:
    """Mean of the vectors of ``words`` that have one; zeros if none do."""
    acc = np.zeros(dim)
    n = 0
    for w in words:
        v = vectors.get(w)
        if v is not None:
            acc += v
            n += 1
    return acc / n if n else acc
