"""Run every table reproduction in one session and print all results.

This is the job that regenerates the numbers recorded in EXPERIMENTS.md:

    python jobs/run_all.py --scale default
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import build_run, show  # noqa: E402

from repro.eval import tables as T  # noqa: E402


def main() -> None:
    run = build_run("datavinci-all-tables")
    for name, fn in [
        ("Table 3", T.table3),
        ("Table 5", T.table5),
        ("Table 6", T.table6),
        ("Table 7", T.table7),
        ("Table 8", T.table8),
        ("Table 9", T.table9),
        ("Table 10", T.table10),
    ]:
        print(f"\n=== {name} (cells are (paper, measured)) ===")
        show(fn(run))


if __name__ == "__main__":
    main()
