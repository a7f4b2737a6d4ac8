"""T-Fig3: ALITE (align + FD) over the paper's T1, T2, T3 -> Fig. 3.

    spark-submit jobs/table_fig3.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import print_table, session  # noqa: E402

from repro.experiments.paper_figs import fig3  # noqa: E402


def main() -> None:
    spark = session("table_fig3")
    ours, paper, _ = fig3(spark)
    print_table("Fig. 3 (paper)", paper)
    print_table("Fig. 3 (ours: FD(T1,T2,T3) with ±/⊥ null kinds)", ours)
    spark.stop()


if __name__ == "__main__":
    main()
