"""Regenerate paper Table 4 (streaming quality comparison).

Usage: python jobs/table4_streaming.py [--scale 1.0]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import scale_arg

from repro.experiments.tables import table4_streaming


def main() -> None:
    args = scale_arg(1.0).parse_args()
    table4_streaming(scale=args.scale)


if __name__ == "__main__":
    main()
