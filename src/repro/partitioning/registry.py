"""Partitioner roster — the paper's Table 2 as a name -> factory map."""
from __future__ import annotations

from typing import Callable

from repro.partitioning.base import EdgePartitioner, VertexPartitioner
from repro.partitioning.edge.dbh import DBHPartitioner
from repro.partitioning.edge.hdrf import HDRFPartitioner
from repro.partitioning.edge.hep import hep10, hep100
from repro.partitioning.edge.random_ep import RandomEdgePartitioner
from repro.partitioning.edge.twops_l import TwoPSLPartitioner
from repro.partitioning.vertex.bytegnn import ByteGNNPartitioner
from repro.partitioning.vertex.kahip_like import KaHIPLikePartitioner
from repro.partitioning.vertex.ldg import LDGPartitioner
from repro.partitioning.vertex.metis_like import MetisLikePartitioner
from repro.partitioning.vertex.random_vp import RandomVertexPartitioner
from repro.partitioning.vertex.spinner import SpinnerPartitioner

# Vertex-cut (edge partitioning) roster — the DistGNN track.
EDGE_PARTITIONERS: dict[str, Callable[[], EdgePartitioner]] = {
    "Random": RandomEdgePartitioner,
    "DBH": DBHPartitioner,
    "HDRF": HDRFPartitioner,
    "2PS-L": TwoPSLPartitioner,
    "HEP10": hep10,
    "HEP100": hep100,
}

# Edge-cut (vertex partitioning) roster — the DistDGL track.
VERTEX_PARTITIONERS: dict[str, Callable[[], VertexPartitioner]] = {
    "Random": RandomVertexPartitioner,
    "LDG": LDGPartitioner,
    "Spinner": SpinnerPartitioner,
    "Metis": MetisLikePartitioner,
    "ByteGNN": ByteGNNPartitioner,
    "KaHIP": KaHIPLikePartitioner,
}


def make_edge_partitioner(name: str) -> EdgePartitioner:
    return EDGE_PARTITIONERS[name]()


def make_vertex_partitioner(name: str) -> VertexPartitioner:
    return VERTEX_PARTITIONERS[name]()
