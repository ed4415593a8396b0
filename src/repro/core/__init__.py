"""Railgun core: aggregators, windows, reservoir, state store, task plan.

This package implements the paper's §3.4/§4.1 single-task machinery:
the event reservoir, the embedded aggregation state store, the task-plan
DAG, and the per-(topic, partition) task processor, plus the Flink-style
hopping-window baselines used by the §5.1 experiment.
"""
