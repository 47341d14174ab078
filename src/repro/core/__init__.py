"""Odyssey core: iSAX summarization, single-node index, exact search."""
