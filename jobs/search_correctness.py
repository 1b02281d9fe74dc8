"""spark-submit entrypoint for experiment E4 (search correctness + latency).

Usage::

    spark-submit jobs/search_correctness.py [--lake DIR] [--sf 0.1]
"""
import argparse

from repro.core.framework import Humboldt
from repro.experiments import e4_search_suite
from repro.jobs_util import ensure_lake, get_session, print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--lake", default="/tmp/humboldt_lake")
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_session("humboldt-e4")
    corpus = ensure_lake(spark, args.lake, sf=args.sf)
    h = Humboldt(spark, args.lake)
    rows = e4_search_suite(h, corpus)
    print_table(f"E4: query suite at SF={args.sf}", rows)
    n_ok = sum(r["oracle_match"] for r in rows)
    print(f"\noracle-correct: {n_ok}/{len(rows)}")
    spark.stop()


if __name__ == "__main__":
    main()
