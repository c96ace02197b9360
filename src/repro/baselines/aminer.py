"""Aminer baseline (Zhang et al., KDD'18) — simplified reimplementation.

Top-down: global paper embeddings refined by local (per-name) information,
clustered by HAC. The original additionally learns from human annotations;
our offline stand-in uses the global three-view embedding with a
conservative HAC cut, which reproduces its high-precision / low-recall
Table III profile.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.baselines.embed import PaperEmbedder, cosine_distance_matrix
from repro.eval.clustering import hac_average


def run_aminer(
    papers: pd.DataFrame,
    names: list[str],
    *,
    embedder: PaperEmbedder | None = None,
    weights: tuple[float, float, float] = (1.0, 1.0, 1.0),
    threshold: float = 0.70,
) -> pd.DataFrame:
    """Cluster each name's papers; returns (name, paper_id, cluster)."""
    emb = embedder if embedder is not None else PaperEmbedder(papers)
    pid_by_name: dict[str, list[int]] = {n: [] for n in names}
    for pid, nms in zip(papers.paper_id, papers.names):
        for n in nms:
            if n in pid_by_name:
                pid_by_name[n].append(pid)
    rows = []
    for name, pids in pid_by_name.items():
        if not pids:
            continue
        X = np.stack([emb.embed(p, name, weights) for p in pids])
        labels = hac_average(cosine_distance_matrix(X), threshold=threshold)
        rows += [(name, p, f"{name}:{l}") for p, l in zip(pids, labels)]
    return pd.DataFrame(rows, columns=["name", "paper_id", "cluster"])
