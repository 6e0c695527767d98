"""Experiment harness: named system configurations and one function per
reproduced paper exhibit."""
