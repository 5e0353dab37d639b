"""spark-submit entrypoint reproducing Table 5: optimal Ss/Sd vs attribute count and types.

Usage: ``spark-submit jobs/run_table5.py [--scale 1.0] [--seed 0] [--out x.csv]``
(or plain ``python jobs/run_table5.py``; the builder itself is pure Python —
Spark is exercised by ``jobs/run_pipeline.py`` and the test suite).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import emit, make_parser

from repro.experiments.tables import table5


def main() -> None:
    args = make_parser(__doc__).parse_args()
    df = table5(scale=args.scale, seed=args.seed)
    emit(df, "Table 5: optimal Ss/Sd vs attribute count and types", args.out)


if __name__ == "__main__":
    main()
