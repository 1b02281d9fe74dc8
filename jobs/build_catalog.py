"""spark-submit entrypoint: build the lake + metadata catalog, print summary.

Usage::

    spark-submit jobs/build_catalog.py [--lake DIR] [--sf 0.1]
"""
import argparse

from repro.catalog.builder import build_catalog
from repro.jobs_util import ensure_lake, get_session, print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--lake", default="/tmp/humboldt_lake")
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    spark = get_session("humboldt-build-catalog")
    corpus = ensure_lake(spark, args.lake, sf=args.sf)
    catalog = build_catalog(spark, args.lake, with_profiles=True)
    print_table(
        "dataset catalog (via humboldt_metadata DataSource)",
        [r.asDict() for r in catalog.dataset_level_meta().orderBy("dataset").collect()],
    )
    print_table(
        "catalog frame sizes",
        [
            {"frame": name, "rows": getattr(catalog, name).count()}
            for name in ("users", "teams", "artifacts", "badges", "tags", "lineage")
        ]
        + [{"frame": "column_profiles", "rows": catalog.column_profiles.count()}],
    )
    print(
        f"\nplanted ground truth: AIRLINES={corpus.airlines_id} "
        f"flagship={corpus.flagship_ids} john_doe_workbooks={corpus.john_doe_workbook_ids}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
