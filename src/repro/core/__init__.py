"""Saga's primary contribution: the knowledge-construction pipeline.

Modules follow the paper's stages: ``ingestion`` (§2.2), ``delta`` (§2.2,
§2.4), ``blocking``/``matching``/``clustering``/``linking`` (§2.3 Linking),
``obr`` (§2.3 Object Resolution), ``fusion`` (§2.3 Fusion), and
``construction`` (§2.4 hybrid batch-incremental orchestration).
"""
