"""Reproduction of "Fast Density-Peaks Clustering: Multicore-based
Parallelization Approach" (Amagata & Hara, SIGMOD 2021) on PySpark.

Layout:
  core/       the paper's contribution (Ex-DPC, Approx-DPC, S-Approx-DPC)
  baselines/  competitors (Scan δ, R-tree+Scan, LSH-DDP, CFSFDP-A)
  index/      spatial-index substrates (kd-trees, R-tree, grid)
  par/        LPT load balancing + Spark task fan-out
  datasets    synthetic substitutes for the paper's datasets
  experiments one function per evaluation table (Tables 2-7)
"""
