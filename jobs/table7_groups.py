"""Reproduce Table 7 (Groups spill study: physical vs virtual)."""
import argparse
import tempfile

from repro.eval.experiments import format_table7, run_groups_spill

from _session import get_session


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--work-dir", default=None)
    args = ap.parse_args()
    spark = get_session("lanns-table7")
    work = args.work_dir or tempfile.mkdtemp(prefix="lanns-groups-")
    rows = run_groups_spill(spark, work, scale=args.scale)
    print("\n=== Table 7: Groups spill study ===\n" + format_table7(rows))
    spark.stop()


if __name__ == "__main__":
    main()
