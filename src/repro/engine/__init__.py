"""Distributed Railgun over MiniKafka (paper §3, §4.2).

``node`` holds the front-end layer (event routing + reply collection,
Fig 3) and the processor unit (Algorithm 1). ``cluster`` wires nodes,
topics and the sticky assignment strategy together, and implements
failure handling and task recovery.
"""
from .cluster import RailgunCluster

__all__ = ["RailgunCluster"]
