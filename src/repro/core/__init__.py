"""The paper's contribution: compact lineage naming, the transactional
GCS with a write-ahead journal, Algorithm 1 (commit protocol) and
Algorithm 2 (pipelined-parallel recovery planning)."""
