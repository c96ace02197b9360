"""Incremental single-paper disambiguation (Section V-E).

A newly published paper by name *a* is an isolated vertex v^a. We compute
its γ vector against every existing GCN vertex named *a*, score with the
already-fitted parameters (posterior only — no retraining), and assign it
to the arg-max vertex iff that score clears δ; otherwise it stays a new
isolated vertex. ``assimilate`` folds the paper into the chosen vertex's
profile so a stream of papers can be judged one by one.
"""
from __future__ import annotations

from typing import Mapping, Sequence

import numpy as np

from repro.core.em import EMParams, score_array
from repro.core.gammas import CorpusStats, Profile, gamma_vector
from repro.core.profiles import row_to_profile
from repro.dblp.generator import STOPWORDS


def paper_keywords(title: str, stats: CorpusStats) -> list[str]:
    """Tokenize a new title the way the batch pipeline did: lower-case,
    stop words removed, restricted to the corpus keyword vocabulary."""
    stop = set(STOPWORDS)
    return sorted(
        {t for t in title.lower().split() if t and t not in stop and t in stats.fb}
    )


def profile_for_paper(paper: Mapping, name: str, stats: CorpusStats) -> Profile:
    """The isolated-vertex profile of a single new paper occurrence."""
    year = int(paper["year"])
    return Profile(
        vertex_id=f"{name}@new{paper['paper_id']}",
        name=name,
        n_papers=1,
        venues={paper["venue"]: 1},
        modal_venue=paper["venue"],
        keywords={k: (1, year, year) for k in paper_keywords(paper["title"], stats)},
        wl={},
        wl_norm=0.0,
        triangles=frozenset(),
    )


class IncrementalJudge:
    """Holds per-name vertex profiles + fitted parameters; judges papers."""

    def __init__(
        self,
        profiles: Sequence[Profile],
        stats: CorpusStats,
        params: EMParams,
        *,
        delta: float = 0.0,
    ) -> None:
        self.stats = stats
        self.params = params
        self.delta = delta
        self.by_name: dict[str, list[Profile]] = {}
        for p in profiles:
            self.by_name.setdefault(p.name, []).append(p)

    @classmethod
    def from_model(cls, model, names: Sequence[str] | None = None) -> "IncrementalJudge":
        """Build from an ``IUADModel``, merging SCN vertex profiles into GCN
        vertices (profiles of merged vertices are combined)."""
        prof_df = model.profiles.profiles
        if names is not None:
            prof_df = prof_df.where(prof_df.name.isin(list(names)))
        rows = prof_df.collect()
        mapping = {
            r["vertex_id"]: r["gcn_vertex"] for r in model.gcn.mapping.collect()
        }
        merged: dict[str, Profile] = {}
        for r in rows:
            p = row_to_profile(r)
            key = mapping.get(p.vertex_id, p.vertex_id)
            if key not in merged:
                merged[key] = Profile(
                    vertex_id=key, name=p.name, n_papers=p.n_papers,
                    venues=dict(p.venues), modal_venue=p.modal_venue,
                    keywords=dict(p.keywords), wl=dict(p.wl), wl_norm=p.wl_norm,
                    triangles=p.triangles,
                )
            else:
                merged[key] = _combine(merged[key], p)
        return cls(list(merged.values()), model.profiles.stats, model.params, delta=model.delta)

    def judge(self, paper: Mapping, name: str) -> tuple[str | None, float]:
        """(assigned vertex_id or None, best score). Pure posterior lookup."""
        cands = self.by_name.get(name, [])
        if not cands:
            return None, float("-inf")
        q = profile_for_paper(paper, name, self.stats)
        X = np.stack([gamma_vector(q, c, self.stats) for c in cands])
        scores = score_array(X, self.params)
        k = int(np.argmax(scores))
        if scores[k] >= self.delta:
            return cands[k].vertex_id, float(scores[k])
        return None, float(scores[k])

    def assimilate(self, paper: Mapping, name: str, vertex_id: str | None) -> str:
        """Fold the paper into ``vertex_id`` (or create a new isolated
        vertex when None); returns the final vertex id."""
        q = profile_for_paper(paper, name, self.stats)
        if vertex_id is None:
            self.by_name.setdefault(name, []).append(q)
            return q.vertex_id
        cands = self.by_name[name]
        for i, c in enumerate(cands):
            if c.vertex_id == vertex_id:
                cands[i] = _combine(c, q)
                return vertex_id
        raise KeyError(f"unknown vertex {vertex_id!r} for name {name!r}")


def _combine(a: Profile, b: Profile) -> Profile:
    """Union of two profiles of one author (merge or assimilation)."""
    venues = dict(a.venues)
    for v, c in b.venues.items():
        venues[v] = venues.get(v, 0) + c
    kws = dict(a.keywords)
    for k, (c, lo, hi) in b.keywords.items():
        if k in kws:
            c0, lo0, hi0 = kws[k]
            kws[k] = (c0 + c, min(lo0, lo), max(hi0, hi))
        else:
            kws[k] = (c, lo, hi)
    wl = dict(a.wl)
    for k, c in b.wl.items():
        wl[k] = wl.get(k, 0.0) + c
    modal = max(venues.items(), key=lambda kv: (kv[1], kv[0]))[0] if venues else None
    return Profile(
        vertex_id=a.vertex_id,
        name=a.name,
        n_papers=a.n_papers + b.n_papers,
        venues=venues,
        modal_venue=modal,
        keywords=kws,
        wl=wl,
        wl_norm=float(np.sqrt(sum(c * c for c in wl.values()))),
        triangles=a.triangles | b.triangles,
    )
