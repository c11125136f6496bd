"""Regenerate the Figure-3 runtime comparison (as table rows).

Usage: python jobs/fig3_runtime.py [--scale 1.0]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import scale_arg

from repro.experiments.tables import fig3_runtime


def main() -> None:
    args = scale_arg(1.0).parse_args()
    fig3_runtime(scale=args.scale)


if __name__ == "__main__":
    main()
