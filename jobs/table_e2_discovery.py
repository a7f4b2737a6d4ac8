"""Table E2: SANTOS-lite / LSH Ensemble discovery quality.

    spark-submit jobs/table_e2_discovery.py --sf 0.1
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser, print_table, session  # noqa: E402

from repro.experiments.e2_discovery import run  # noqa: E402


def main() -> None:
    args = argparser("table E2").parse_args()
    spark = session("table_e2")
    print_table(
        f"E2: discovery precision/recall at SF={args.sf}",
        run(spark, sf=args.sf, seed=args.seed),
    )
    spark.stop()


if __name__ == "__main__":
    main()
