"""spark-submit entrypoint reproducing Appendix Table 19: batch processing.

Usage: ``spark-submit jobs/run_table19.py [--scale 1.0] [--seed 0] [--out x.csv]``
(or plain ``python jobs/run_table19.py``; the builder itself is pure Python —
Spark is exercised by ``jobs/run_pipeline.py`` and the test suite).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import emit, make_parser

from repro.experiments.tables import table19


def main() -> None:
    args = make_parser(__doc__).parse_args()
    df = table19(scale=args.scale, seed=args.seed)
    emit(df, "Appendix Table 19: batch processing", args.out)


if __name__ == "__main__":
    main()
