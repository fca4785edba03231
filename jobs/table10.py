"""Reproduce Table 10 (runtime/disk/memory) of the paper."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import build_run, show  # noqa: E402

from repro.eval.tables import table10  # noqa: E402


def main() -> None:
    run = build_run("datavinci-table10")
    show(table10(run))


if __name__ == "__main__":
    main()
