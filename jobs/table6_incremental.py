"""Table VI: incremental disambiguation of 100/200/300 new papers.

    spark-submit jobs/table6_incremental.py --sf 0.1
"""
import sys
from pathlib import Path

import pandas as pd

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark, print_side_by_side  # noqa: E402

from repro.dblp.generator import generate  # noqa: E402
from repro.exp.paper_numbers import TABLE6  # noqa: E402
from repro.exp.tables import table6  # noqa: E402


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("table6")
    corpus = generate(sf=args.sf, seed=args.seed)
    t = table6(
        spark, corpus, n_names=args.names, eta=args.eta, delta=args.delta, seed=0
    )
    print_side_by_side("Table VI", t, pd.DataFrame(TABLE6).to_string())
    spark.stop()


if __name__ == "__main__":
    main()
