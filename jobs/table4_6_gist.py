"""Reproduce Tables 4-6 (GIST1M stand-in). --scale shrinks the dataset."""
import argparse
import tempfile

from repro.eval.experiments import (
    PAPER_T4, PAPER_T5, PAPER_T6, format_build_table, format_query_table,
    format_table_1_or_4, run_gist,
)

from _session import get_session


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--work-dir", default=None)
    args = ap.parse_args()
    spark = get_session("lanns-table4-6")
    work = args.work_dir or tempfile.mkdtemp(prefix="lanns-gist-")
    res = run_gist(spark, work, scale=args.scale)
    print("\n=== Table 4: GIST recall ===\n" + format_table_1_or_4(res, PAPER_T4))
    print("\n=== Table 5: GIST build times ===\n" + format_build_table(res, PAPER_T5, "(1,8)"))
    print("\n=== Table 6: GIST query times ===\n" + format_query_table(res, PAPER_T6, ("(1,8)",)))
    spark.stop()


if __name__ == "__main__":
    main()
