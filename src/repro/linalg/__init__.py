"""Sparse transition-matrix linear algebra: numpy kernels and the Spark
DataFrame message-passing engine."""
