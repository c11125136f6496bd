"""spark-submit entrypoint: streaming ρ-approximate DBSCAN (Algorithm 3).

Pass 1 runs as a Structured Streaming query (file source, availableNow,
foreachBatch into the bounded-memory state machine); passes 2-3 re-scan the
stream files in chunks. Prints quality + the Theorem-4 memory footprint.

Usage: python jobs/run_streaming.py [--scale 0.5] [--dataset session_stream]
"""
import sys
import tempfile
from pathlib import Path

import numpy as np

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, scale_arg

from repro.core.streaming import (
    StreamingDBSCAN,
    stream_chunks,
    structured_pass1,
    write_stream_dir,
)
from repro.experiments.datasets import SPECS
from repro.metrics.quality import adjusted_mutual_info, adjusted_rand_index


def main() -> None:
    p = scale_arg(0.25)
    p.add_argument("--dataset", default="session_stream", choices=sorted(SPECS))
    p.add_argument("--rho", type=float, default=0.5)
    p.add_argument("--chunk", type=int, default=2048)
    args = p.parse_args()
    spec = SPECS[args.dataset]
    X, y = spec.load(args.scale)
    spark = get_spark("repro-streaming-dbscan")
    state = StreamingDBSCAN(spec.metric, spec.eps, spec.minpts, args.rho)
    with tempfile.TemporaryDirectory() as d:
        sdir = str(Path(d) / "stream")
        point_col = "text" if X.dtype == object else "features"
        write_stream_dir(X, y, sdir, args.chunk)
        stats = structured_pass1(spark, state, sdir, point_col=point_col)
        chunks = stream_chunks(X, args.chunk)
        state.begin_pass2()
        for b in chunks:
            state.pass2_batch(b)
        state.finish_pass2()
        labels = np.concatenate([state.pass3_batch(b) for b in chunks])
    print(
        f"dataset={args.dataset} n={len(X)} rho={args.rho} "
        f"clusters={state.n_clusters} |E|={stats.n_centers} |M|={stats.n_m} "
        f"mem_ratio={stats.memory_ratio:.4f} "
        f"ARI={adjusted_rand_index(labels, y):.3f} "
        f"AMI={adjusted_mutual_info(labels, y):.3f}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
