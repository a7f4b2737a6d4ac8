"""T-Fig8a/b/cd: outer join vs FD over T4, T5, T6 and ER over each.

    spark-submit jobs/table_fig8.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import print_table, session  # noqa: E402

from repro.experiments.paper_figs import fig8  # noqa: E402


def main() -> None:
    spark = session("table_fig8")
    for name, pdf in fig8(spark).items():
        print_table(name, pdf)
    spark.stop()


if __name__ == "__main__":
    main()
