"""Regenerate paper Table 3 (ARI/AMI vs non-DBSCAN baselines).

Usage: python jobs/table3_quality.py [--scale 1.0]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import scale_arg

from repro.experiments.tables import table3_quality


def main() -> None:
    p = scale_arg(1.0)
    p.add_argument(
        "--densitypeak-max-n", type=int, default=2000,
        help="stand-in for the paper's 500GB OOM: density-peak needs the "
        "full n^2 matrix and is marked '*' beyond this n",
    )
    args = p.parse_args()
    table3_quality(scale=args.scale, densitypeak_max_n=args.densitypeak_max_n)


if __name__ == "__main__":
    main()
