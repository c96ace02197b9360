"""Training-sample construction for the generative model.

Two mechanisms from Section V-F:

* **10 % pair sampling** — the model is trained on a random sample of the
  candidate pairs, not all of them (speed).
* **Imbalance mitigation** — matched pairs are rare among candidates, so the
  paper "partitions a vertex with many published papers into two vertices at
  random"; the two halves form a guaranteed-matched pair. We implement the
  split at profile level: venue and keyword multisets are divided
  binomially, paper counts halved, and structural features (WL, triangles)
  shared — exactly what two halves of one author's output look like.
"""
from __future__ import annotations

import numpy as np

from repro.core.gammas import CorpusStats, Profile, gamma_vector


def split_profile(p: Profile, rng: np.random.Generator) -> tuple[Profile, Profile]:
    """Randomly partition a vertex's papers into two pseudo-vertices."""
    n1 = max(1, int(rng.binomial(p.n_papers, 0.5)))
    n2 = max(1, p.n_papers - n1)

    def halve_counts(counts: dict[str, int]) -> tuple[dict, dict]:
        a: dict[str, int] = {}
        b: dict[str, int] = {}
        for k, c in counts.items():
            ca = int(rng.binomial(c, 0.5))
            if ca:
                a[k] = ca
            if c - ca:
                b[k] = c - ca
        return a, b

    va, vb = halve_counts(p.venues)
    ka, kb = halve_counts({k: c for k, (c, _, _) in p.keywords.items()})

    def rebuild_kw(half: dict[str, int]) -> dict[str, tuple[int, int, int]]:
        return {k: (c, p.keywords[k][1], p.keywords[k][2]) for k, c in half.items()}

    def modal(v: dict[str, int]) -> str | None:
        return max(v.items(), key=lambda kv: (kv[1], kv[0]))[0] if v else p.modal_venue

    # Structural features (WL map, triangles) are dropped from the halves:
    # a genuine cross-phase matched pair has disjoint collaboration
    # structure, so keeping the parent's identical WL/triangles would teach
    # the matched component γ₁ = γ₂ = 1 — the opposite of what real matched
    # pairs look like.
    mk = lambda n, v, kws, tag: Profile(  # noqa: E731
        vertex_id=f"{p.vertex_id}%{tag}",
        name=p.name,
        n_papers=n,
        venues=v,
        modal_venue=modal(v),
        keywords=rebuild_kw(kws),
        wl={},
        wl_norm=0.0,
        triangles=frozenset(),
    )
    return mk(n1, va, ka, "a"), mk(n2, vb, kb, "b")


def synthetic_matched_gammas(
    profiles: list[Profile],
    stats: CorpusStats,
    *,
    n: int,
    min_papers: int = 6,
    seed: int = 0,
) -> np.ndarray:
    """γ vectors of ``n`` split-pair (guaranteed matched) samples drawn from
    prolific vertices. Empty (0, 6) array if no vertex is prolific enough."""
    rng = np.random.default_rng(seed)
    pool = [p for p in profiles if p.n_papers >= min_papers]
    if not pool or n <= 0:
        return np.zeros((0, 6))
    out = []
    for _ in range(n):
        p = pool[int(rng.integers(len(pool)))]
        a, b = split_profile(p, rng)
        out.append(gamma_vector(a, b, stats))
    return np.stack(out)
