"""Regenerate the Figure-6 streaming memory-ratio sweep (as table rows).

Usage: python jobs/fig6_memory.py [--scale 1.0]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import scale_arg

from repro.experiments.tables import fig6_memory


def main() -> None:
    args = scale_arg(1.0).parse_args()
    fig6_memory(scale=args.scale)


if __name__ == "__main__":
    main()
