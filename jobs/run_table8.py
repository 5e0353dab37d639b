"""spark-submit entrypoint reproducing Table 8 (+15): MDG ablation.

Usage: ``spark-submit jobs/run_table8.py [--scale 1.0] [--seed 0] [--out x.csv]``
(or plain ``python jobs/run_table8.py``; the builder itself is pure Python —
Spark is exercised by ``jobs/run_pipeline.py`` and the test suite).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import emit, make_parser

from repro.experiments.tables import table8


def main() -> None:
    args = make_parser(__doc__).parse_args()
    df = table8(scale=args.scale, seed=args.seed)
    emit(df, "Table 8 (+15): MDG ablation", args.out)


if __name__ == "__main__":
    main()
