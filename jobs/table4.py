"""Emit paper Table 4 (algorithm summary — static, from code metadata).

Usage: python jobs/table4.py. Writes ``results/table4.csv``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent.parent / "src"))

from repro.eval.table4 import format_table4, run_table4  # noqa: E402


def main() -> None:
    df = run_table4()
    out = pathlib.Path(__file__).resolve().parent.parent / "results"
    out.mkdir(exist_ok=True)
    df.to_csv(out / "table4.csv", index=False)
    print(format_table4(df))


if __name__ == "__main__":
    main()
