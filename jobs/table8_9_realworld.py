"""Reproduce Tables 8-9 (real-world dataset proxies)."""
import argparse
import tempfile

from repro.eval.experiments import format_table8, format_table9, run_realworld

from _session import get_session


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--work-dir", default=None)
    args = ap.parse_args()
    spark = get_session("lanns-table8-9")
    work = args.work_dir or tempfile.mkdtemp(prefix="lanns-rw-")
    rows = run_realworld(spark, work, scale=args.scale)
    print("\n=== Table 8: build/query times ===\n" + format_table8(rows))
    print("\n=== Table 9: recall ===\n" + format_table9(rows))
    spark.stop()


if __name__ == "__main__":
    main()
