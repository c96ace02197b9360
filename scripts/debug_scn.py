"""Local (no-Spark) SCN reference for fast debugging of FP/FN sources."""
import sys
from collections import Counter, defaultdict
from itertools import combinations

import numpy as np
import pandas as pd

from repro.dblp.generator import generate, author_paper_pairs
from repro.dblp.testing import testing_set
from repro.graph.components import UnionFind


def local_scn(papers: pd.DataFrame, eta: int):
    pair_cnt = Counter()
    for nms in papers.names:
        for a, b in combinations(sorted(nms), 2):
            pair_cnt[(a, b)] += 1
    scrs = {p for p, c in pair_cnt.items() if c >= eta}
    partners = defaultdict(set)
    for a, b in scrs:
        partners[a].add(b)
        partners[b].add(a)
    # partner components per name
    comp = {}
    for x, ps in partners.items():
        uf = UnionFind()
        for p in ps:
            uf.add(p)
        for y, z in combinations(sorted(ps), 2):
            if (min(y, z), max(y, z)) in scrs:
                uf.union(y, z)
        comp[x] = uf.components()
    # assignment
    assign = {}
    for pid, nms in papers[["paper_id", "names"]].itertuples(index=False):
        nset = set(nms)
        for x in nms:
            votes = Counter()
            for y in nset:
                if y != x and (min(x, y), max(x, y)) in scrs:
                    votes[comp[x][y]] += 1
            if votes:
                best = max(votes.items(), key=lambda kv: (kv[1], kv[0]))[0]
                assign[(pid, x)] = f"{x}#{best}"
            else:
                assign[(pid, x)] = f"{x}@{pid}"
    return scrs, comp, assign


def main():
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.01
    eta = int(sys.argv[2]) if len(sys.argv) > 2 else 3
    c = generate(sf=sf, seed=7)
    occ = author_paper_pairs(c.papers)
    ts = testing_set(c.papers)
    tnames = set(ts.name)
    scrs, comp, assign = local_scn(c.papers, eta)
    occ = occ[occ.name.isin(tnames)].copy()
    occ["cluster"] = [assign[(p, n)] for p, n in zip(occ.paper_id, occ.name)]

    tp = fp = fn = tn = 0
    fp_examples = Counter()
    fn_names = Counter()
    for name, grp in occ.groupby("name"):
        rows = list(grp[["paper_id", "cluster", "author_id"]].itertuples(index=False))
        for r1, r2 in combinations(rows, 2):
            ps, ts_ = r1.cluster == r2.cluster, r1.author_id == r2.author_id
            tp += ps and ts_; fp += ps and not ts_; fn += ts_ and not ps; tn += not ps and not ts_
            if ps and not ts_:
                fp_examples[(name, r1.cluster)] += 1
            if ts_ and not ps:
                fn_names[name] += 1
    print(f"eta={eta} TP={tp} FP={fp} FN={fn} TN={tn}")
    print(f"P={tp/(tp+fp):.4f} R={tp/(tp+fn):.4f} A={(tp+tn)/(tp+fp+fn+tn):.4f}")
    print("top FP clusters:", fp_examples.most_common(8))
    # dissect one FP cluster
    if fp_examples:
        (name, cl), _ = fp_examples.most_common(1)[0]
        sub = occ[(occ.name == name) & (occ.cluster == cl)]
        print(f"cluster {cl}: authors {sub.author_id.value_counts().to_dict()}")
        auths = c.authors.set_index("author_id")
        print("topics:", {a: auths.loc[a, 'topic'] for a in sub.author_id.unique()})


if __name__ == "__main__":
    main()
