"""spark-submit entrypoint for experiment E5 (joinability provider quality).

Usage::

    spark-submit jobs/joinability_eval.py [--lake DIR] [--sf 0.1] [--k 64]
"""
import argparse

from repro.experiments import e5_joinability
from repro.jobs_util import ensure_lake, get_session, print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--lake", default="/tmp/humboldt_lake")
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--k", type=int, default=64)
    args = ap.parse_args()
    spark = get_session("humboldt-e5")
    ensure_lake(spark, args.lake, sf=args.sf)
    rows = e5_joinability(spark, args.lake, k=args.k)
    print_table(
        f"E5: MinHash joinability vs exact containment (SF={args.sf}, k={args.k})",
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
