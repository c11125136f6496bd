"""Reproduction of "Towards Metric DBSCAN: Exact, Approximate, and
Streaming Algorithms" (Mo, Song, Ding — SIGMOD 2024) in PySpark.

Subpackages
-----------
``repro.core``       — the paper's contribution: radius-guided Gonzalez,
                       exact metric DBSCAN, ρ-approximate DBSCAN via core-point
                       summary, and the 3-pass streaming variant.
``repro.metrics``    — metric-space abstraction (Euclidean / edit distance)
                       and clustering-quality scores (ARI / AMI).
``repro.covertree``  — vanilla cover tree (Beygelzimer et al. 2006) used for
                       the bichromatic-closest-pair step of exact DBSCAN.
``repro.baselines``  — every comparator from the evaluation section:
                       original DBSCAN, DBSCAN++, DYW_DBSCAN, GT exact/approx,
                       DP-means, BICO, Density-peak, Meanshift, and the
                       streaming engines DBStream / D-Stream / evoStream.
``repro.data``       — synthetic dataset generators standing in for the
                       paper's datasets (see DESIGN.md §3).
"""
