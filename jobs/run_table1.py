"""Print Table I (dataset statistics) for the six synthetic analogues.

    spark-submit jobs/run_table1.py [--scale 1.0]
"""
import argparse
import sys

sys.path.insert(0, ".")
from jobs._session import get_session  # noqa: E402

from repro.graph import gen  # noqa: E402
from repro.graph.builder import degrees, from_pandas  # noqa: E402


def main() -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--scale", type=float, default=1.0)
    args = p.parse_args()
    spark = get_session("table1")
    print("| dataset | n=|V| | m=|E| | d_max |")
    print("|---|---|---|---|")
    for name in sorted(gen.DATASETS):
        v, e = gen.DATASETS[name](scale=args.scale)
        g = from_pandas(spark, v, e)
        dmax = degrees(g).agg({"degree": "max"}).first()[0]
        print(f"| {name} | {len(v):,} | {len(e):,} | {dmax:,} |")
    spark.stop()


if __name__ == "__main__":
    main()
