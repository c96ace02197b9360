"""End-to-end IUAD (Algorithm 1): papers → SCN → similarities → EM → GCN."""
from __future__ import annotations

import dataclasses

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.em import EMParams, fit_em
from repro.core.gammas import GAMMA_NAMES
from repro.core.gcn import GCN, build_gcn, score_pairs
from repro.core.profiles import ProfileSet, build_profiles, row_to_profile
from repro.core.sampling import synthetic_matched_gammas
from repro.core.scn import SCN, build_scn
from repro.core.similarity import pair_similarities


@dataclasses.dataclass
class IUADModel:
    """Everything the pipeline produced: reusable for incremental judgement."""

    scn: SCN
    profiles: ProfileSet
    pairs: DataFrame  # γ vectors + score for every candidate pair
    params: EMParams
    gcn: GCN
    delta: float


def run_iuad(
    spark: SparkSession,
    papers: DataFrame,
    *,
    eta: int = 5,
    delta: float = 0.0,
    sample_frac: float = 0.10,
    balance: bool = True,
    wl_h: int = 2,
    embed_dim: int = 64,
    seed: int = 0,
    em_iters: int = 60,
) -> IUADModel:
    """Run both stages of IUAD and return the fitted model + GCN.

    ``sample_frac`` is the paper's 10 % training sample of candidate pairs;
    ``balance`` enables the vertex-splitting imbalance mitigation (V-F.2);
    ``delta`` is the decision threshold on the log posterior-odds score.
    """
    scn = build_scn(papers, eta=eta)
    ps = build_profiles(spark, papers, scn, wl_h=wl_h, embed_dim=embed_dim)
    profiles = ps.profiles
    pairs = pair_similarities(profiles, ps.stats).localCheckpoint(eager=False)

    # ---- training sample (10 % of candidate pairs) ----------------------
    n_pairs = pairs.count()
    frac = 1.0 if n_pairs * sample_frac < 200 else sample_frac
    sample = pairs.sample(fraction=min(frac, 1.0), seed=seed).select(*GAMMA_NAMES).toPandas()
    X = sample.to_numpy(dtype=float)

    if balance and len(X):
        prolific = (
            profiles.where(F.col("n_papers") >= 6)
            .orderBy(F.desc("n_papers"))
            .limit(2000)
            .collect()
        )
        profs = [row_to_profile(r) for r in prolific]
        n_synth = max(30, int(0.15 * len(X)))
        synth = synthetic_matched_gammas(profs, ps.stats, n=n_synth, seed=seed)
        if len(synth):
            X = np.vstack([X, synth])

    params: EMParams = fit_em(X, seed=seed, n_iter=em_iters)

    pairs_scored = score_pairs(pairs, params).cache()
    gcn = build_gcn(scn.assignments, pairs_scored, delta=delta)
    return IUADModel(
        scn=scn, profiles=ps, pairs=pairs_scored, params=params, gcn=gcn, delta=delta
    )


def scn_only_assignments(model: IUADModel) -> DataFrame:
    """Stage-I-only clustering (for the Table IV ablation): every SCN vertex
    is its own author."""
    return model.scn.assignments.select(
        "paper_id", "name", F.col("vertex_id").alias("cluster")
    )


def gcn_assignments(model: IUADModel) -> DataFrame:
    """Final clustering after Stage II merging."""
    return model.gcn.assignments.select(
        "paper_id", "name", F.col("gcn_vertex").alias("cluster")
    )
