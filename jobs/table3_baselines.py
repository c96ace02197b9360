"""Table III: IUAD vs 4 supervised + 4 unsupervised baselines.

    spark-submit jobs/table3_baselines.py --sf 0.1 --names 50
"""
import sys
from pathlib import Path

import pandas as pd

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark, print_side_by_side  # noqa: E402

from repro.dblp.generator import generate  # noqa: E402
from repro.exp.paper_numbers import TABLE3  # noqa: E402
from repro.exp.tables import table3  # noqa: E402


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("table3")
    corpus = generate(sf=args.sf, seed=args.seed)
    t = table3(
        spark, corpus, n_names=args.names, eta=args.eta, delta=args.delta, seed=0
    )
    paper = pd.DataFrame(TABLE3).T.reset_index(names="method")
    print_side_by_side("Table III", t, paper.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
