"""The Live Graph (§4): low-latency serving of stable knowledge unioned
with real-time streaming sources, plus the KGQ query engine, intent
handling with multi-turn context, and human-in-the-loop curation."""
