"""Table E1: FD vs outer join vs union at scale.

    spark-submit jobs/table_e1_integration.py --sf 0.1
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser, print_table, session  # noqa: E402

from repro.experiments.e1_integration import run  # noqa: E402


def main() -> None:
    args = argparser("table E1").parse_args()
    spark = session("table_e1")
    print_table(
        f"E1: integration operators at SF={args.sf}",
        run(spark, sf=args.sf, seed=args.seed),
    )
    spark.stop()


if __name__ == "__main__":
    main()
