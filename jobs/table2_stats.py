"""Table II: descriptive statistics of the testing set.

    spark-submit jobs/table2_stats.py --sf 0.1 --names 50
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.dblp.generator import generate  # noqa: E402
from repro.exp.paper_numbers import TABLE2_TOTALS  # noqa: E402
from repro.exp.tables import table2  # noqa: E402


def main() -> None:
    args = base_parser(__doc__).parse_args()
    corpus = generate(sf=args.sf, seed=args.seed)
    t = table2(corpus, n_names=args.names)
    print(t.to_string(index=False))
    print("\npaper totals:", TABLE2_TOTALS)


if __name__ == "__main__":
    main()
