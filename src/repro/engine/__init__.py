"""Pipelined query engine substrate: real pandas kernels, simulated
cluster (workers/NICs/NVMe/durable store) and simulated time."""
