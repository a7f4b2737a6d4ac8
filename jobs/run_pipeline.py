"""End-to-end DIALITE demo: generate a lake, discover, integrate with
ALITE, analyze.

    spark-submit jobs/run_pipeline.py --sf 0.01 --k 4
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser, print_table, session  # noqa: E402

from repro.core.pipeline import DIALITE  # noqa: E402
from repro.discovery.lsh_ensemble import LSHEnsemble  # noqa: E402
from repro.discovery.santos import Santos  # noqa: E402
from repro.lake.catalog import Catalog  # noqa: E402
from repro.lake.generator import (  # noqa: E402
    DOMAIN_ATTRS,
    generate_lake,
    spec_for_sf,
)


def main() -> None:
    p = argparser("end-to-end DIALITE pipeline")
    p.add_argument("--k", type=int, default=4)
    args = p.parse_args()
    spark = session("dialite_pipeline")
    lake = generate_lake(spec_for_sf(args.sf, seed=args.seed))
    catalog = Catalog.from_lake(spark, lake)
    d = DIALITE(spark, catalog)
    d.register_discovery(Santos(lake.kb))
    d.register_discovery(LSHEnsemble(threshold=0.5))

    query_name = [
        n for n in catalog.table_names()
        if lake.truth[n].domain == "city_stats"
    ][0]
    t = lake.truth[query_name]
    key_header = [
        h for h, a in t.columns.items() if a == DOMAIN_ATTRS[t.domain][0]
    ][0]
    query = catalog.table(query_name)

    outcome, result = d.run(query, key_header, k=args.k)
    print(f"query table: {query_name} (intent column: {key_header})")
    for algo, hits in outcome.per_algorithm.items():
        print(f"  {algo}: {[(h.table, round(h.score, 2)) for h in hits]}")
    print(f"integration set: {outcome.integration_set}")
    integrated = result.table
    print(f"ALITE integrated table: {integrated.count()} tuples, "
          f"{len(result.value_columns)} integration IDs")
    completeness = d.analyze(
        "completeness", integrated, result.value_columns
    )
    print(f"completeness: {completeness:.3f}")
    print_table("sample of integrated table",
                integrated.drop("_tids").limit(10).toPandas())
    spark.stop()


if __name__ == "__main__":
    main()
