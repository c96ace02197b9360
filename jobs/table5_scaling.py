"""Table V: average time per name at 20/40/60/80/100 % of the data.

    spark-submit jobs/table5_scaling.py --sf 0.1
"""
import sys
from pathlib import Path

import pandas as pd

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark, print_side_by_side  # noqa: E402

from repro.dblp.generator import generate  # noqa: E402
from repro.exp.paper_numbers import TABLE5  # noqa: E402
from repro.exp.tables import table5  # noqa: E402


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("table5")
    corpus = generate(sf=args.sf, seed=args.seed)
    t = table5(
        spark, corpus, n_names=args.names, eta=args.eta, delta=args.delta, seed=0
    )
    paper = pd.DataFrame(TABLE5, index=["20%", "40%", "60%", "80%", "100%"]).T
    print_side_by_side("Table V (seconds per name)", t, paper.to_string())
    spark.stop()


if __name__ == "__main__":
    main()
