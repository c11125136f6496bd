"""Structured Streaming integration: pass 1 via foreachBatch over a file
source ≡ the sequential chunked run, then passes 2–3 complete on the files."""
import numpy as np
import pytest

from repro.core.streaming import (
    StreamingDBSCAN,
    stream_chunks,
    structured_pass1,
    write_stream_dir,
)
from repro.data.clustergen import make_moons, session_stream
from repro.metrics.quality import adjusted_rand_index
from repro.metrics.space import EuclideanMetric

EUC = EuclideanMetric()


@pytest.fixture(scope="module")
def stream_setup(tmp_path_factory):
    X, y = make_moons(600, seed=0)
    d = tmp_path_factory.mktemp("stream") / "moons"
    write_stream_dir(X, y, str(d), chunk_size=150)
    return X, y, str(d)


def test_write_stream_dir_files(stream_setup):
    import os

    X, _, d = stream_setup
    files = sorted(f for f in os.listdir(d) if f.endswith(".parquet"))
    assert len(files) == 4
    import pandas as pd

    total = sum(len(pd.read_parquet(os.path.join(d, f))) for f in files)
    assert total == len(X)


def test_structured_pass1_matches_sequential(spark, stream_setup):
    X, _, d = stream_setup
    seq = StreamingDBSCAN(EUC, 0.15, 10, 0.5)
    for b in stream_chunks(X, 150):
        seq.pass1_batch(b)
    ss = StreamingDBSCAN(EUC, 0.15, 10, 0.5)
    stats = structured_pass1(spark, ss, d)
    assert stats.n_seen == len(X)
    assert len(seq.centers) == len(ss.centers)
    assert np.allclose(np.asarray(seq.centers), np.asarray(ss.centers))
    assert seq.counts == ss.counts
    assert sorted(seq.m_points) == sorted(ss.m_points)


def test_structured_then_finish_offline(spark, stream_setup):
    """Hybrid pipeline: Structured Streaming pass 1, batch passes 2–3."""
    X, y, d = stream_setup
    s = StreamingDBSCAN(EUC, 0.15, 10, 0.5)
    structured_pass1(spark, s, d)
    chunks = stream_chunks(X, 150)
    s.begin_pass2()
    for b in chunks:
        s.pass2_batch(b)
    s.finish_pass2()
    labels = np.concatenate([s.pass3_batch(b) for b in chunks])
    assert adjusted_rand_index(labels, y) > 0.8
    assert s.n_clusters >= 2
