"""T-Ex3: Example 3 analytics over the Fig. 3 integrated table.

    spark-submit jobs/table_ex3.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import print_table, session  # noqa: E402

from repro.experiments.paper_figs import ex3  # noqa: E402


def main() -> None:
    spark = session("table_ex3")
    print_table("Example 3 analytics (paper vs measured)", ex3(spark))
    spark.stop()


if __name__ == "__main__":
    main()
