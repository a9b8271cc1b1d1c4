"""HiBench-lite workloads: real PySpark DataFrame implementations of
the paper's benchmark tasks (§6.1: Bayes, KMeans, NWeight, WordCount,
PageRank, TeraSort — plus Sort, LR, SVD used in the meta-learning
experiments, and the four production Spark SQL tasks of Table 2).

Each module exposes pure functions ``SparkSession/DataFrame → DataFrame``
checked against DuckDB or NumPy references in tests; ``runner`` runs
them under honourable local-mode knobs and measures the byte/CPU ratios
that calibrate :mod:`repro.simcluster.profile`.
"""
