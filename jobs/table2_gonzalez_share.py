"""Regenerate paper Table 2 (Radius-guided Gonzalez runtime share).

Usage: python jobs/table2_gonzalez_share.py [--scale 1.0]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import scale_arg

from repro.experiments.tables import table2_gonzalez_share


def main() -> None:
    args = scale_arg(1.0).parse_args()
    table2_gonzalez_share(scale=args.scale)


if __name__ == "__main__":
    main()
