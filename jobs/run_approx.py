"""spark-submit entrypoint: distributed ρ-approximate DBSCAN (Algorithm 2).

Usage: python jobs/run_approx.py [--scale 0.5] [--dataset moons] [--rho 0.5]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, scale_arg

from repro.core.spark_dbscan import approx_dbscan_spark
from repro.experiments.datasets import SPECS
from repro.metrics.quality import adjusted_mutual_info, adjusted_rand_index


def main() -> None:
    p = scale_arg(0.25)
    p.add_argument("--dataset", default="moons", choices=sorted(SPECS))
    p.add_argument("--rho", type=float, default=0.5)
    args = p.parse_args()
    spec = SPECS[args.dataset]
    X, y = spec.load(args.scale)
    spark = get_spark("repro-approx-dbscan")
    res = approx_dbscan_spark(
        spark, X, spec.metric, spec.eps, spec.minpts, args.rho
    )
    print(
        f"dataset={args.dataset} n={len(X)} rho={args.rho} "
        f"clusters={res.n_clusters} |S*|={len(res.summary_idx)} "
        f"ARI={adjusted_rand_index(res.labels, y):.3f} "
        f"AMI={adjusted_mutual_info(res.labels, y):.3f}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
