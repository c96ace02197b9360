"""Dump scored candidate pairs with ground truth and analyze score quality."""
import os
import sys

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
import numpy as np
import pandas as pd
from pyspark.sql import SparkSession, functions as F

from repro.core.pipeline import run_iuad
from repro.dblp.generator import generate, author_paper_pairs

sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.01
eta = int(sys.argv[2]) if len(sys.argv) > 2 else 4

spark = (SparkSession.builder.appName("dbg")
         .config("spark.sql.shuffle.partitions", "8")
         .config("spark.sql.execution.arrow.pyspark.enabled", "true").getOrCreate())
spark.sparkContext.setLogLevel("ERROR")
c = generate(sf=sf, seed=7)
papers = c.to_spark(spark).cache()
model = run_iuad(spark, papers, eta=eta, delta=0.0, seed=0)

# vertex -> majority true author
occ = author_paper_pairs(c.papers)
asg = model.scn.assignments.toPandas()
asg = asg.merge(occ, on=["paper_id", "name"])
vmaj = asg.groupby("vertex_id").agg(
    author=("author_id", lambda s: s.mode().iloc[0]),
    purity=("author_id", lambda s: (s == s.mode().iloc[0]).mean()),
    n=("author_id", "size"),
)
print("vertex purity:", vmaj.purity.mean().round(4), "| vertices:", len(vmaj))

pairs = model.pairs.toPandas()
pairs = pairs.merge(vmaj.add_prefix("i_"), left_on="vid_i", right_index=True)
pairs = pairs.merge(vmaj.add_prefix("j_"), left_on="vid_j", right_index=True)
pairs["matched"] = pairs.i_author == pairs.j_author
print("n pairs:", len(pairs), "truly matched frac:", pairs.matched.mean().round(4))
for m in (True, False):
    sub = pairs[pairs.matched == m]
    print(f"matched={m}: n={len(sub)} score quantiles:",
          np.round(np.quantile(sub.score, [0.05, 0.25, 0.5, 0.75, 0.95]), 2))
print("\nscore>0 by matched:", pairs.groupby("matched").score.apply(lambda s: (s >= 0).mean()).round(4).to_dict())
for d in [0, 4, 8, 12, 16, 20, 30]:
    sub = pairs[pairs.score >= d]
    print(f"delta={d}: pairs merged={len(sub)}, precision of merges={(sub.matched.mean() if len(sub) else 0):.4f}")

wrong = pairs[(~pairs.matched) & (pairs.score >= 8)]
print("\nworst wrong merges (top gamma means):")
print(wrong[["g1_wl","g2_clique","g3_interest","g4_time","g5_repr_comm","g6_comm"]].describe().loc[["mean","50%","max"]].round(3))
ok = pairs[(pairs.matched) & (pairs.score >= 8)]
print("\ntrue merges gammas:")
print(ok[["g1_wl","g2_clique","g3_interest","g4_time","g5_repr_comm","g6_comm"]].describe().loc[["mean","50%","max"]].round(3))
pairs.to_parquet("/tmp/pairs_debug.parquet")
spark.stop()
