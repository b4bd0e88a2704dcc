"""Reproduce Tables 1-3 (SIFT1M stand-in). --scale shrinks the dataset."""
import argparse
import tempfile

from repro.eval.experiments import (
    PAPER_T1, PAPER_T2, PAPER_T3, format_build_table, format_query_table,
    format_table_1_or_4, run_sift,
)

from _session import get_session


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--work-dir", default=None)
    args = ap.parse_args()
    spark = get_session("lanns-table1-3")
    work = args.work_dir or tempfile.mkdtemp(prefix="lanns-sift-")
    res = run_sift(spark, work, scale=args.scale)
    print("\n=== Table 1: SIFT recall ===\n" + format_table_1_or_4(res, PAPER_T1))
    print("\n=== Table 2: SIFT build times ===\n" + format_build_table(res, PAPER_T2, "(1,8)"))
    print("\n=== Table 3: SIFT query times ===\n" + format_query_table(res, PAPER_T3, ("(1,8)", "(2,4)")))
    spark.stop()


if __name__ == "__main__":
    main()
