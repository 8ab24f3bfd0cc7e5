"""Reproduce paper Table 2 (effectiveness: AR / MR / RR).

Usage: spark-submit jobs/table2.py  (or plain ``python jobs/table2.py``)

The effectiveness protocol is driver-side numpy (per-pair metrics over the
full subtrajectory distance matrix — see DESIGN.md §3); Spark is not needed
for this table, matching the paper's per-pair definition of AR/MR/RR.
Writes ``results/table2.csv`` and prints the paper-shaped pivot.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent.parent / "src"))

from repro.eval.table2 import format_table2, run_table2  # noqa: E402


def main() -> None:
    df = run_table2(profile_names=("porto", "xian"))
    out = pathlib.Path(__file__).resolve().parent.parent / "results"
    out.mkdir(exist_ok=True)
    df.to_csv(out / "table2.csv", index=False)
    print(format_table2(df))
    print(f"\nwrote {out / 'table2.csv'}")


if __name__ == "__main__":
    main()
