"""spark-submit entrypoint for experiments E2 (task completion) and E3
(questionnaire statistics).

Usage::

    spark-submit jobs/study_tables.py [--lake DIR] [--sf 0.01]
"""
import argparse

from repro.core.framework import Humboldt
from repro.experiments import e2_completion, e3_questionnaire
from repro.jobs_util import ensure_lake, get_session, print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--lake", default="/tmp/humboldt_lake_study")
    ap.add_argument("--sf", type=float, default=0.01)
    args = ap.parse_args()
    spark = get_session("humboldt-e2-e3")
    corpus = ensure_lake(spark, args.lake, sf=args.sf)
    h = Humboldt(spark, args.lake)
    print_table("E2: simulated task completion (paper §7.2)", e2_completion(h, corpus))
    print_table("E3: questionnaire statistics (paper Fig. 8)", e3_questionnaire(spark))
    spark.stop()


if __name__ == "__main__":
    main()
