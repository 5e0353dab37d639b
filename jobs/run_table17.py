"""spark-submit entrypoint reproducing Appendix Table 17: few-shot learning.

Usage: ``spark-submit jobs/run_table17.py [--scale 1.0] [--seed 0] [--out x.csv]``
(or plain ``python jobs/run_table17.py``; the builder itself is pure Python —
Spark is exercised by ``jobs/run_pipeline.py`` and the test suite).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import emit, make_parser

from repro.experiments.tables import table17


def main() -> None:
    args = make_parser(__doc__).parse_args()
    df = table17(scale=args.scale, seed=args.seed)
    emit(df, "Appendix Table 17: few-shot learning", args.out)


if __name__ == "__main__":
    main()
