"""spark-submit entrypoint for experiment E1 (expressivity).

Prints the spec-size vs generated-surface table recorded in EXPERIMENTS.md.

Usage::

    spark-submit jobs/expressivity.py [--lake DIR] [--sf 0.1]
"""
import argparse

from repro.core.framework import Humboldt
from repro.experiments import e1_expressivity
from repro.jobs_util import ensure_lake, get_session, print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--lake", default="/tmp/humboldt_lake")
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_session("humboldt-e1")
    ensure_lake(spark, args.lake, sf=args.sf)
    h = Humboldt(spark, args.lake, with_profiles=False)
    print_table("E1: expressivity — spec vs generated surface", e1_expressivity(h))
    n_views = len(h.overview_views())
    print(f"\ngenerated overview views (no-input providers): {n_views}")
    spark.stop()


if __name__ == "__main__":
    main()
