"""Benchmark dataset substrates: synthetic SNAP-like graphs (SGPB),
IMDB-lite (JOB), and LSQB-lite (LDBC social network). All generators are
deterministic in their seeds so the DuckDB oracle sees identical inputs."""
