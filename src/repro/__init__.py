"""Reproduction of "Scalable Time-Range k-Core Query on Temporal Graphs"
(Yang et al., VLDB 2023). See DESIGN.md for the system map."""
