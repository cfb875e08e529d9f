"""Reproduction of "Distributed Representations of Tuples for Entity
Resolution" (DeepER, PVLDB 11(11), 2018) on PySpark.

Subpackages: ``nn`` (numpy DL substrate), ``embeddings`` (synthetic
pre-trained dictionaries + retrofitting), ``er_data`` (Table-3-shaped
benchmark generators), ``core`` (DeepER composition/similarity/classifier
pipeline), ``blocking`` (LSH blocking as a Spark dataflow), ``baselines``
(Magellan-lite), ``experiments`` (table harnesses). See DESIGN.md.
"""
