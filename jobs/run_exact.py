"""spark-submit entrypoint: distributed exact metric DBSCAN on one dataset.

Usage: python jobs/run_exact.py [--scale 0.5] [--dataset moons]
Runs the Spark dataflow (Algorithm 1 + Steps 1-3 as applyInPandas groups) and
prints cluster statistics plus agreement with the planted labels.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, scale_arg

from repro.core.spark_dbscan import exact_dbscan_spark
from repro.experiments.datasets import SPECS
from repro.metrics.quality import adjusted_mutual_info, adjusted_rand_index


def main() -> None:
    p = scale_arg(0.25)
    p.add_argument("--dataset", default="moons", choices=sorted(SPECS))
    args = p.parse_args()
    spec = SPECS[args.dataset]
    X, y = spec.load(args.scale)
    spark = get_spark("repro-exact-dbscan")
    res = exact_dbscan_spark(spark, X, spec.metric, spec.eps, spec.minpts)
    print(
        f"dataset={args.dataset} n={len(X)} eps={spec.eps} minpts={spec.minpts} "
        f"clusters={res.n_clusters} cores={int(res.is_core.sum())} "
        f"outliers={int((res.labels == -1).sum())} "
        f"ARI={adjusted_rand_index(res.labels, y):.3f} "
        f"AMI={adjusted_mutual_info(res.labels, y):.3f}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
