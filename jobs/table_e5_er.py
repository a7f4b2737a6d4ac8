"""Table E5: downstream ER over FD vs outer join vs union.

    spark-submit jobs/table_e5_er.py --sf 0.1
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser, print_table, session  # noqa: E402

from repro.experiments.e5_er import run  # noqa: E402


def main() -> None:
    args = argparser("table E5").parse_args()
    spark = session("table_e5")
    print_table(
        f"E5: ER over integration results at SF={args.sf}",
        run(spark, sf=args.sf, seed=args.seed),
    )
    spark.stop()


if __name__ == "__main__":
    main()
