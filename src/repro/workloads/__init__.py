"""Paper workloads: TPC-H (22 queries), the hybrid data-science notebooks
and the covariance micro-benchmark."""
