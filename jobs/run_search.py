"""spark-submit entrypoint: run one discovery query, print ranked results.

Usage::

    spark-submit jobs/run_search.py "type: table badged: endorsed" \
        [--lake DIR] [--sf 0.1] [--limit 20]
"""
import argparse

from repro.core.framework import Humboldt
from repro.jobs_util import ensure_lake, get_session, print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("query")
    ap.add_argument("--lake", default="/tmp/humboldt_lake")
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--limit", type=int, default=20)
    args = ap.parse_args()
    spark = get_session("humboldt-search")
    ensure_lake(spark, args.lake, sf=args.sf)
    h = Humboldt(spark, args.lake)
    rows = [
        {
            "artifact_id": r["artifact_id"],
            "name": r["name"],
            "type": r["artifact_type"],
            "owner": r["owner_name"],
            "score": round(r["score"], 4),
        }
        for r in h.search(args.query, limit=args.limit).collect()
    ]
    print_table(f"results for {args.query!r}", rows)
    spark.stop()


if __name__ == "__main__":
    main()
