"""Generate and persist a synthetic open-data lake as Parquet.

    spark-submit jobs/build_lake.py --sf 0.1 --out /tmp/lake
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import argparser  # noqa: E402

from repro.lake.generator import generate_lake, spec_for_sf  # noqa: E402


def main() -> None:
    p = argparser("build a synthetic open-data lake")
    p.add_argument("--out", required=True)
    p.add_argument("--variant-noise", type=float, default=0.0)
    args = p.parse_args()
    lake = generate_lake(
        spec_for_sf(args.sf, seed=args.seed, variant_noise=args.variant_noise)
    )
    lake.write(args.out)
    print(
        f"wrote {len(lake.frames)} tables "
        f"({sum(t.n_rows for t in lake.truth.values())} rows) to {args.out}"
    )


if __name__ == "__main__":
    main()
