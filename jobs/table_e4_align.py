"""Table E4: holistic schema matching quality.

    spark-submit jobs/table_e4_align.py --sf 0.1
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser, print_table, session  # noqa: E402

from repro.experiments.e4_align import run  # noqa: E402


def main() -> None:
    args = argparser("table E4").parse_args()
    spark = session("table_e4")
    print_table(
        f"E4: alignment quality at SF={args.sf}",
        run(spark, sf=args.sf, seed=args.seed),
    )
    spark.stop()


if __name__ == "__main__":
    main()
