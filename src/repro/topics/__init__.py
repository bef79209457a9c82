"""Synthetic probabilistic topic-model substrate.

The paper treats the topic model (LDA / BTM) as a black-box oracle that
provides ``p_i(w)`` for every word and ``p_i(e)`` for every element.  We
implement that oracle generatively: :class:`repro.topics.model.TopicModel`
holds sparse per-topic Zipf word distributions and performs the
query-by-keyword inference used to turn keyword queries into query
vectors.
"""
from repro.topics.model import TopicModel

__all__ = ["TopicModel"]
