"""PASS core: partition trees, variance algebra, partitioning optimisers.

Modules:
    query       — rectangular subpopulation-aggregate queries (§3.1)
    variance    — φ-transform estimators, CIs, hard bounds, prefix-sum 𝒱
    partitioner — 1-D partitioning algorithms incl. the ADP dynamic program
    tree        — partition tree, MCF traversal (§3.2)
    kdtree      — KD-PASS / KD-US tree construction (§4.4)
    spark_build — Spark-side leaf bucketing, groupBy aggregates, sampling
    synopsis    — the PASS synopsis: build + answer (§3.3)
"""
