"""Reproduce Table 6 of the paper (see repro.eval.tables.table6)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import build_run, show  # noqa: E402

from repro.eval.tables import table6  # noqa: E402


def main() -> None:
    run = build_run("datavinci-table6")
    show(table6(run))


if __name__ == "__main__":
    main()
