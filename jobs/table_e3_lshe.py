"""Table E3: LSH Ensemble vs exact containment.

    spark-submit jobs/table_e3_lshe.py --sf 0.1
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser, print_table, session  # noqa: E402

from repro.experiments.e3_lshe import run  # noqa: E402


def main() -> None:
    args = argparser("table E3").parse_args()
    spark = session("table_e3")
    print_table(
        f"E3: LSHE vs exact containment at SF={args.sf}",
        run(spark, sf=args.sf, seed=args.seed),
    )
    spark.stop()


if __name__ == "__main__":
    main()
